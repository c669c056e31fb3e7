"""T3 — paper Figure 4: wall time of Base / Paral / Paral+ per dataset
and h (Base reported as INF past the budget, as in the paper).

Usage::

    spark-submit jobs/table3_efficiency.py \
        [--datasets YT,VL,...] [--h-values 2,3] [--budget 300] [--scale S]
"""
import argparse

from repro.bench import fmt_seconds, markdown_table, run_efficiency_cell


def run(spark, datasets, h_values, budget_s=300.0, scale=None) -> str:
    """Render T3 rows: one line per (dataset, h) with the three columns."""
    rows = []
    for d in datasets:
        for h in h_values:
            cells = []
            for algo in ("base", "paral", "paral+"):
                secs, _ = run_efficiency_cell(
                    spark, d, h, algo, budget_s=budget_s, scale=scale
                )
                cells.append(fmt_seconds(secs))
            rows.append([d, h] + cells)
    return markdown_table(["dataset", "h", "Base", "Paral", "Paral+"], rows)


def main():
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--datasets", default="YT,VL,SC,GA,AM,AN")
    ap.add_argument("--h-values", default="2,3")
    ap.add_argument("--budget", type=float, default=300.0)
    ap.add_argument("--scale", type=float, default=None)
    args = ap.parse_args()
    from _session import get_spark

    spark = get_spark("table3-efficiency")
    print(
        run(
            spark,
            args.datasets.split(","),
            [int(x) for x in args.h_values.split(",")],
            budget_s=args.budget,
            scale=args.scale,
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
