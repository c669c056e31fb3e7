"""T2 — paper Figure 3: per-sweep H-index values on the toy graph.

Prints one row per iteration order (row (0) = initial 2-supports), one
column per edge — the same layout as the paper's figure.

Usage: ``spark-submit jobs/table2_toy_convergence.py [--h H]``
"""
import argparse

from repro.bench import markdown_table, table2_trace


def run(spark, h: int = 2) -> str:
    """Render the Figure-3 table for the toy graph at the given h."""
    trace, sweeps = table2_trace(spark, h)
    edges = [f"({r.src},{r.dst})" for r in trace[0].itertuples(index=False)]
    rows = [
        [f"({i})"] + frame["hval"].tolist() for i, frame in enumerate(trace)
    ]
    table = markdown_table(["n-order"] + edges, rows)
    return f"{table}\n\nconverged after {sweeps} sweeps"


def main():
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--h", type=int, default=2)
    args = ap.parse_args()
    from _session import get_spark

    spark = get_spark("table2-toy-convergence")
    print(run(spark, args.h))
    spark.stop()


if __name__ == "__main__":
    main()
