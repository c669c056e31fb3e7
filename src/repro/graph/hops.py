"""h-hop neighborhood pair table.

``hop_pairs_df`` materializes ``(a, b, dist)`` for every ordered vertex
pair with ``1 <= dist(a, b) <= h`` — the N(v, h) sets of the paper as
one relation. Computed by BFS-style frontier expansion: ``h - 1``
join/dedup rounds over the symmetric adjacency, subtracting
already-known pairs with a left-anti join so each pair carries its true
(shortest-path) distance.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .edges import adjacency_df


def hop_pairs_df(edges: DataFrame, h: int) -> DataFrame:
    """All vertex pairs within ``h`` hops, with their distance.

    The result is symmetric (both ``(a,b)`` and ``(b,a)`` present) and
    excludes ``dist = 0``. For ``h = 1`` this is exactly the adjacency.
    """
    if h < 1:
        raise ValueError(f"h must be >= 1, got {h}")
    adj = adjacency_df(edges).select("a", "b")
    known = adj.withColumn("dist", F.lit(1))
    frontier = known.select("a", "b")
    for d in range(2, h + 1):
        grown = (
            frontier.alias("f")
            .join(adj.alias("e"), F.col("f.b") == F.col("e.a"))
            .select(F.col("f.a").alias("a"), F.col("e.b").alias("b"))
            .where(F.col("a") != F.col("b"))
            .distinct()
        )
        frontier = grown.join(
            known.select("a", "b"), on=["a", "b"], how="left_anti"
        )
        known = known.unionByName(frontier.withColumn("dist", F.lit(d)))
    return known
