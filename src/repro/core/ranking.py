"""Score ranking (paper Fig. 4 step 3).

Joins centrality scores back to value labels and orders them in the
measure's homograph direction: BC descending, LCC ascending.
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import BipartiteGraph

#: Per-measure sort direction: True = ascending = homographs first.
MEASURE_ASCENDING = {"bc": False, "lcc": True}


def attach_labels(
    graph: BipartiteGraph, scores: DataFrame, *, score_col: str, fill: float = 0.0
) -> DataFrame:
    """``(label, score)`` for every value node of the graph.

    Value nodes absent from ``scores`` (e.g. zero-BC nodes, which the
    sparse reducer never emits) get ``fill``.
    """
    return (
        graph.value_nodes()
        .join(scores.select("node_id", score_col), on="node_id", how="left")
        .withColumn(score_col, F.coalesce(F.col(score_col), F.lit(float(fill))))
        .select("label", score_col)
    )


def rank_values(labeled: DataFrame, *, score_col: str, ascending: bool) -> DataFrame:
    """Add a dense 1-based ``rank`` column, ties broken by label."""
    order = [
        F.col(score_col).asc() if ascending else F.col(score_col).desc(),
        F.col("label").asc(),
    ]
    return labeled.withColumn("rank", F.row_number().over(Window.orderBy(*order)))
