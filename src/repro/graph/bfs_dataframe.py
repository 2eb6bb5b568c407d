"""Pregel-style single-source BFS in the DataFrame API.

Computes shortest-path distance and number-of-shortest-paths (Brandes'
``sigma``) from one source over the bipartite graph, as an iterative
sequence of Catalyst-planned joins — the GraphX-substitute dataflow
(DESIGN.md substitution 2). Used to cross-validate the broadcast-CSR
kernel; the kernel is the production path.
"""
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def symmetric_edges(edges: DataFrame) -> DataFrame:
    """Undirected view ``(src, dst)`` of the ``(value_id, attr_id)``
    edge list, with each edge in both directions."""
    return edges.select(
        F.col("value_id").alias("src"), F.col("attr_id").alias("dst")
    ).unionByName(
        edges.select(F.col("attr_id").alias("src"), F.col("value_id").alias("dst"))
    )


def bfs_sssp(
    spark: SparkSession, edges: DataFrame, source: int, *, max_iter: int = 64
) -> DataFrame:
    """``(node, dist, sigma)`` for every node reachable from ``source``.

    Level-synchronous: each round expands the frontier through one join,
    sums path counts into newly discovered nodes, and drops nodes already
    visited. ``localCheckpoint`` truncates lineage so the loop does not
    accumulate an unbounded plan.
    """
    sym = symmetric_edges(edges).cache()
    frontier = spark.createDataFrame(
        [(int(source), 0, 1.0)], schema="node long, dist int, sigma double"
    )
    visited = frontier.localCheckpoint()
    frontier = visited
    for d in range(max_iter):
        nxt = (
            frontier.join(sym, frontier["node"] == sym["src"])
            .groupBy(F.col("dst").alias("node"))
            .agg(F.sum("sigma").alias("sigma"))
            .join(visited.select("node"), on="node", how="left_anti")
            .withColumn("dist", F.lit(d + 1))
            .select("node", "dist", "sigma")
            .localCheckpoint()
        )
        if nxt.isEmpty():
            break
        visited = visited.unionByName(nxt).localCheckpoint()
        frontier = nxt
    sym.unpersist()
    return visited
