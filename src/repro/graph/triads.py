"""Common-h-neighbor triads and h-support (Definitions 2-3) as dataflow.

A *triad* row ``(eid, src, dst, w)`` states that vertex ``w`` is a
common h-neighbor of edge ``(src, dst)``: ``w ∉ {src, dst}`` and both
endpoints reach ``w`` within ``h`` hops in the full graph. For ``h = 1``
a triad is a triangle, and h-support degenerates to classic triangle
support.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def triads_df(edges: DataFrame, hops: DataFrame) -> DataFrame:
    """``(eid, src, dst, w)`` for every ``w ∈ Δ_G((src,dst), h)``.

    ``hops`` is the output of :func:`repro.graph.hops.hop_pairs_df` for
    the same graph and the desired ``h``.
    """
    near = hops.select("a", "b")
    from_src = edges.join(near, edges.src == near.a).select(
        "eid", "src", "dst", F.col("b").alias("w")
    )
    from_dst = edges.join(near, edges.dst == near.a).select(
        "eid", F.col("b").alias("w")
    )
    return (
        from_src.join(from_dst, on=["eid", "w"])
        .where((F.col("w") != F.col("src")) & (F.col("w") != F.col("dst")))
        .select("eid", "src", "dst", "w")
    )


def h_support_df(edges: DataFrame, hops: DataFrame) -> DataFrame:
    """``(eid, src, dst, support)`` — h-support of every edge.

    Edges with an empty Δ (no common h-neighbors) are kept with
    ``support = 0`` via the left join, which matters: they must still
    receive trussness 2 downstream.
    """
    counts = triads_df(edges, hops).groupBy("eid").agg(
        F.count("*").alias("support")
    )
    return (
        edges.join(counts, on="eid", how="left")
        .select(
            "eid",
            "src",
            "dst",
            F.coalesce(F.col("support"), F.lit(0)).alias("support"),
        )
    )
