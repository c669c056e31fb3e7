"""Generic decomposition entrypoint: one dataset, one h, one variant.

Usage::

    spark-submit jobs/run_decomposition.py --dataset YT --h 2 \
        [--variant paral+] [--scale S] [--out /path/result.parquet]

Prints the trussness histogram; optionally writes the full edge-level
result as Parquet.
"""
import argparse

from repro.core import decompose
from repro.graphgen import dataset_edges


def run(spark, dataset, h, variant="paral", scale=None, out=None):
    """Run one decomposition; returns (histogram dict, sweeps)."""
    edges = dataset_edges(dataset, scale)
    res = decompose(spark, edges, h, variant=variant)
    if out:
        res.trussness.write.mode("overwrite").parquet(out)
    hist = {
        int(r.trussness): int(r.cnt)
        for r in res.trussness.groupBy("trussness")
        .count()
        .withColumnRenamed("count", "cnt")
        .collect()
    }
    return hist, res.sweeps


def main():
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--dataset", required=True)
    ap.add_argument("--h", type=int, default=2)
    ap.add_argument("--variant", default="paral")
    ap.add_argument("--scale", type=float, default=None)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    from _session import get_spark

    spark = get_spark(f"decompose-{args.dataset}-h{args.h}-{args.variant}")
    hist, sweeps = run(
        spark, args.dataset, args.h, args.variant, args.scale, args.out
    )
    print(f"dataset={args.dataset} h={args.h} variant={args.variant} sweeps={sweeps}")
    for k in sorted(hist):
        print(f"  trussness {k}: {hist[k]} edges")
    spark.stop()


if __name__ == "__main__":
    main()
