"""Tests for bipartite graph construction (repro.core.graph, paper §3.2)."""
import pytest
from pyspark.sql import functions as F

from repro.core.graph import build_graph, incidences
from repro.lakes.datalake import lake_from_tables
from repro.oracle import assert_equivalent
from tests.fixtures import EXAMPLE31_TABLES, FIGURE1_TABLES


@pytest.fixture(scope="module")
def fig1(spark):
    return lake_from_tables(spark, FIGURE1_TABLES)


@pytest.fixture(scope="module")
def g31(spark):
    return build_graph(
        lake_from_tables(spark, EXAMPLE31_TABLES), prune_unique=False
    )


def test_incidences_oracle(spark, fig1):
    got = incidences(fig1)
    assert_equivalent(
        got,
        """
        SELECT DISTINCT table_id || '.' || col_id AS attr,
               UPPER(TRIM(value)) AS value
        FROM cells
        WHERE value IS NOT NULL AND TRIM(value) <> ''
        """,
        cells=fig1.toPandas(),
    )


def test_example31_counts(g31):
    # 8 distinct values, 4 attributes, 14 incidences (paper Fig. 3b).
    assert g31.n_values == 8
    assert g31.n_attrs == 4
    assert g31.n_edges == 14
    assert g31.n_nodes == 12


def test_value_and_attr_id_ranges(g31):
    nodes = g31.nodes.toPandas()
    vals = nodes[nodes.is_value]
    attrs = nodes[~nodes.is_value]
    assert sorted(vals.node_id) == list(range(g31.n_values))
    assert sorted(attrs.node_id) == list(
        range(g31.n_values, g31.n_values + g31.n_attrs)
    )


def test_node_ids_deterministic_by_label(g31):
    vals = g31.nodes.where("is_value").orderBy("node_id").toPandas()
    assert list(vals.label) == sorted(vals.label)


def test_each_value_is_single_node(g31):
    # JAGUAR occurs in all four attributes but is one node (paper §3.2).
    nodes = g31.nodes.toPandas()
    assert (nodes.label == "JAGUAR").sum() == 1
    jid = int(nodes.loc[nodes.label == "JAGUAR", "node_id"].iloc[0])
    assert g31.edges.where(F.col("value_id") == jid).count() == 4


def test_value_degrees_oracle(spark, fig1):
    graph = build_graph(fig1, prune_unique=False)
    got = graph.value_degrees().join(
        graph.nodes.where("is_value"), on="node_id"
    ).select(F.col("label").alias("value"), "degree")
    assert_equivalent(
        got,
        """
        SELECT value, COUNT(*) AS degree FROM (
            SELECT DISTINCT table_id || '.' || col_id AS attr,
                   UPPER(TRIM(value)) AS value
            FROM cells WHERE value IS NOT NULL AND TRIM(value) <> ''
        ) GROUP BY value
        """,
        cells=fig1.toPandas(),
    )


def test_prune_unique_keeps_only_multi_attribute_values(spark, fig1):
    pruned = build_graph(fig1, prune_unique=True)
    labels = set(pruned.value_nodes().toPandas().label)
    # the full Figure-1 lake's multi-attribute values ("2" repeats only
    # within T2.num, so it is pruned):
    assert labels == {"JAGUAR", "PUMA", "PANDA", "TOYOTA"}
    assert pruned.n_attrs == 12  # attribute universe unchanged
    degs = pruned.value_degrees().toPandas()
    assert (degs.degree >= 2).all()


def test_prune_false_keeps_all(spark, fig1):
    full = build_graph(fig1, prune_unique=False)
    assert full.n_values == 37


def test_edges_reference_valid_nodes(g31):
    nodes = set(g31.nodes.toPandas().node_id)
    edges = g31.edges.toPandas()
    assert set(edges.value_id) <= nodes
    assert set(edges.attr_id) <= nodes
    assert (edges.value_id < g31.n_values).all()
    assert (edges.attr_id >= g31.n_values).all()


def test_edges_distinct(g31):
    e = g31.edges.toPandas()
    assert len(e) == len(e.drop_duplicates())


def test_build_graph_idempotent_counts(spark, fig1):
    g1 = build_graph(fig1, prune_unique=False)
    g2 = build_graph(fig1, prune_unique=False)
    assert (g1.n_values, g1.n_attrs, g1.n_edges) == (
        g2.n_values,
        g2.n_attrs,
        g2.n_edges,
    )
    assert g1.nodes.toPandas().equals(g2.nodes.toPandas())
