"""DomainNet bipartite graph construction (paper §3.2, Fig. 4 step 1).

Nodes are data values and attributes; an edge ``(v, a)`` exists iff
normalized value ``v`` occurs in attribute ``a``. Each distinct value is
one node no matter how many attributes it occurs in.

The graph is materialized as two DataFrames:

- ``nodes``: ``(node_id long, label string, is_value boolean)`` —
  value nodes take ids ``[0, n_values)``, attribute nodes
  ``[n_values, n_values + n_attrs)``; ids are dense and deterministic
  (ordered by label) so downstream numpy kernels can index arrays by id.
- ``edges``: ``(value_id long, attr_id long)`` — one row per distinct
  (value, attribute) incidence.

Paper §5 pre-processing: values occurring in a single attribute cannot be
homographs; ``prune_unique=True`` (default) removes them, shrinking the
graph (≈3% of nodes on TUS, ≈30% on SB per the paper).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.normalize import ATTR_COL, VALUE_COL, normalize_cells


@dataclass(frozen=True)
class BipartiteGraph:
    """The DomainNet graph plus its size counters.

    ``n_values`` + ``n_attrs`` = total node count; ``n_edges`` counts
    undirected value–attribute edges once.
    """

    nodes: DataFrame
    edges: DataFrame
    n_values: int
    n_attrs: int
    n_edges: int

    @property
    def n_nodes(self) -> int:
        return self.n_values + self.n_attrs

    def value_nodes(self) -> DataFrame:
        """``(node_id, label)`` for value nodes only."""
        return self.nodes.where("is_value").select("node_id", "label")

    def value_degrees(self) -> DataFrame:
        """``(node_id, degree)`` — number of attributes per value node."""
        return self.edges.groupBy(F.col("value_id").alias("node_id")).agg(
            F.count("*").alias("degree")
        )


def incidences(cells: DataFrame) -> DataFrame:
    """Distinct normalized ``(attr, value)`` incidences of a lake."""
    return normalize_cells(cells).select(ATTR_COL, VALUE_COL).distinct()


def build_graph(cells: DataFrame, *, prune_unique: bool = True) -> BipartiteGraph:
    """Construct the DomainNet bipartite graph from a cells relation.

    ``prune_unique`` drops value nodes whose degree is 1 (they cannot be
    homographs — paper §5). Attribute nodes are kept even if all their
    values were pruned, mirroring the paper's attribute-node universe.
    """
    inc = incidences(cells)
    if prune_unique:
        multi = (
            inc.groupBy(VALUE_COL)
            .agg(F.count("*").alias("deg"))
            .where("deg >= 2")
            .select(VALUE_COL)
        )
        inc = inc.join(multi, on=VALUE_COL, how="inner")
    inc = inc.cache()

    # Dense deterministic ids: values first (ordered by label), then attrs.
    w = Window.orderBy("label")
    values = (
        inc.select(F.col(VALUE_COL).alias("label"))
        .distinct()
        .withColumn("node_id", F.row_number().over(w) - F.lit(1))
        .withColumn("is_value", F.lit(True))
    )
    n_values = values.count()
    attrs = (
        # Attribute universe comes from the *unpruned* lake so attribute
        # node ids are stable across prune settings of the same lake.
        normalize_cells(cells)
        .select(F.col(ATTR_COL).alias("label"))
        .distinct()
        .withColumn("node_id", F.row_number().over(w) - F.lit(1) + F.lit(n_values))
        .withColumn("is_value", F.lit(False))
    )
    n_attrs = attrs.count()
    nodes = values.unionByName(attrs).select("node_id", "label", "is_value").cache()

    edges = (
        inc.join(values.withColumnRenamed("label", VALUE_COL), on=VALUE_COL)
        .withColumnRenamed("node_id", "value_id")
        .join(
            attrs.select(F.col("label").alias(ATTR_COL), F.col("node_id").alias("attr_id")),
            on=ATTR_COL,
        )
        .select("value_id", "attr_id")
    ).cache()
    n_edges = edges.count()
    inc.unpersist()
    return BipartiteGraph(nodes, edges, n_values, n_attrs, n_edges)
