"""T1 — paper Table 1: dataset statistics, paper vs synthetic stand-in.

Usage: ``spark-submit jobs/table1_datasets.py [--scale S]``
(no Spark work needed — generators are NumPy — but kept as a job for a
uniform interface; ``--scale`` defaults to each dataset's bench scale).
"""
import argparse

from repro.bench import markdown_table, table1_rows


def run(scale=None) -> str:
    """Render T1 as markdown (paper |V|,|E| vs generated |V|,|E|)."""
    rows = table1_rows(scale)
    return markdown_table(
        ["key", "dataset", "|V| paper", "|E| paper", "|V| ours", "|E| ours"],
        rows,
    )


def main():
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=None,
                    help="scale factor (default: per-dataset bench scale)")
    args = ap.parse_args()
    print(run(args.scale))


if __name__ == "__main__":
    main()
