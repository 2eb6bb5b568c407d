"""Tests for the CSR adjacency substrate (repro.graph.csr)."""
import numpy as np
import pytest

from repro.core.graph import build_graph
from repro.graph.csr import csr_from_arrays, csr_from_edges
from repro.lakes.datalake import lake_from_tables
from tests.fixtures import EXAMPLE31_TABLES


def test_single_edge():
    csr = csr_from_arrays(np.array([0]), np.array([1]), 2)
    assert csr.n == 2
    assert csr.n_undirected_edges == 1
    assert list(csr.neighbors(0)) == [1]
    assert list(csr.neighbors(1)) == [0]


def test_triangle_degrees():
    csr = csr_from_arrays(np.array([0, 1, 2]), np.array([1, 2, 0]), 3)
    assert list(csr.degrees()) == [2, 2, 2]


def test_isolated_nodes():
    csr = csr_from_arrays(np.array([0]), np.array([1]), 5)
    assert csr.n == 5
    for u in (2, 3, 4):
        assert len(csr.neighbors(u)) == 0
    assert list(csr.degrees()) == [1, 1, 0, 0, 0]


def test_symmetry_random():
    rng = np.random.default_rng(0)
    n, m = 30, 80
    src = rng.integers(0, n, m)
    dst = rng.integers(0, n, m)
    csr = csr_from_arrays(src, dst, n)
    # undirected: u in N(v) iff v in N(u), with multiplicity
    for u in range(n):
        for v in csr.neighbors(u):
            assert (csr.neighbors(int(v)) == u).sum() >= 1
    assert len(csr.indices) == 2 * m
    assert csr.indptr[-1] == len(csr.indices)


def test_csr_from_edges_matches_graph(spark):
    g = build_graph(lake_from_tables(spark, EXAMPLE31_TABLES), prune_unique=False)
    csr = csr_from_edges(g.edges, g.n_nodes)
    assert csr.n == 12
    assert csr.n_undirected_edges == 14
    # value-node degrees equal attribute counts
    degs = {r.node_id: r.degree for r in g.value_degrees().collect()}
    for node_id, deg in degs.items():
        assert len(csr.neighbors(node_id)) == deg


def test_degrees_sum_to_twice_edges():
    rng = np.random.default_rng(1)
    src = rng.integers(0, 20, 50)
    dst = rng.integers(0, 20, 50)
    csr = csr_from_arrays(src, dst, 20)
    assert csr.degrees().sum() == 2 * 50


@pytest.mark.parametrize("n", [1, 2, 7])
def test_no_edges(n):
    csr = csr_from_arrays(np.array([], dtype=np.int64), np.array([], dtype=np.int64), n)
    assert csr.n == n
    assert csr.n_undirected_edges == 0
    assert list(csr.degrees()) == [0] * n
