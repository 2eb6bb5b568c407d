"""Bipartite local clustering coefficient (paper §3.3, Hypothesis 3.4).

For a value node ``u`` with attribute set ``A(u)``, and value-neighbors
``N(u)`` (distinct values sharing ≥1 attribute with ``u``):

    c_uv  = |A(u) ∩ A(v)| / |A(u) ∪ A(v)|          (pairwise coefficient)
    LCC(u) = mean over v ∈ N(u) of c_uv            (Equation 1)

This is the Latapy-style bipartite LCC; as the paper notes, it reduces to
the average Jaccard similarity between attribute sets, and it reproduces
the paper's Example 3.6 values (0.36 / 0.43 / 0.46) exactly.

Implemented entirely in the DataFrame API: a self-join on attribute
produces co-occurring value pairs, a group-by counts shared attributes,
degrees complete the Jaccard, and a final group-by averages per value.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.graph import BipartiteGraph


def lcc_scores(graph: BipartiteGraph) -> DataFrame:
    """LCC per value node: ``(node_id, lcc)``.

    Value nodes with no value-neighbors (sole occupant of their
    attributes) have an undefined mean; they are emitted with LCC = 1.0,
    the "maximally clustered" end of the scale, since the measure is
    ranked ascending and such nodes carry no homograph evidence.
    """
    e = graph.edges
    deg = e.groupBy("value_id").agg(F.count("*").alias("deg"))

    pairs = (
        e.alias("a")
        .join(e.alias("b"), on="attr_id")
        .where(F.col("a.value_id") < F.col("b.value_id"))
        .groupBy(
            F.col("a.value_id").alias("v"), F.col("b.value_id").alias("w")
        )
        .agg(F.count("*").alias("inter"))
    )
    jac = (
        pairs.join(deg.select(F.col("value_id").alias("v"), F.col("deg").alias("dv")), on="v")
        .join(deg.select(F.col("value_id").alias("w"), F.col("deg").alias("dw")), on="w")
        .withColumn("jaccard", F.col("inter") / (F.col("dv") + F.col("dw") - F.col("inter")))
    )
    sym = jac.select(F.col("v").alias("node_id"), "jaccard").unionByName(
        jac.select(F.col("w").alias("node_id"), "jaccard")
    )
    means = sym.groupBy("node_id").agg(F.avg("jaccard").alias("lcc"))
    return (
        deg.select(F.col("value_id").alias("node_id"))
        .join(means, on="node_id", how="left")
        .withColumn("lcc", F.coalesce(F.col("lcc"), F.lit(1.0)))
    )
