"""T5 — paper Figure 6: iteration (sweep) count, Paral vs Asyn.

Usage::

    spark-submit jobs/table5_iterations.py \
        [--datasets YT,VL,SC,GA,AM,AN] [--h-values 2,3]
"""
import argparse

from repro.bench import (
    markdown_table,
    run_iterations_cell,
    run_serial_iterations_cell,
)


def run(spark, datasets, h_values, scale=None) -> str:
    """Render T5: sweeps of Paral and Asyn per (dataset, h).

    Two Asyn columns: the Spark chromatic schedule and the serial
    per-edge schedule (the paper's exact shared-memory semantics)."""
    rows = []
    for d in datasets:
        for h in h_values:
            paral = run_iterations_cell(spark, d, h, "paral", scale=scale)
            asyn = run_iterations_cell(spark, d, h, "asyn", scale=scale)
            serial = run_serial_iterations_cell(d, h, True, scale=scale)
            rows.append(
                [d, h, paral, asyn, serial, f"{paral / max(serial, 1):.2f}x"]
            )
    return markdown_table(
        ["dataset", "h", "Paral sweeps", "Asyn (chromatic)",
         "Asyn (per-edge)", "per-edge reduction"],
        rows,
    )


def main():
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--datasets", default="YT,VL,SC,GA,AM,AN")
    ap.add_argument("--h-values", default="2,3")
    ap.add_argument("--scale", type=float, default=None)
    args = ap.parse_args()
    from _session import get_spark

    spark = get_spark("table5-iterations")
    print(
        run(
            spark,
            args.datasets.split(","),
            [int(x) for x in args.h_values.split(",")],
            scale=args.scale,
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
