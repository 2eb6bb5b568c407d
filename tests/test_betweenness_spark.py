"""Distributed-BC tests: the Spark fan-out must agree exactly with the
single-process kernel, and the sampled estimator must behave."""
import numpy as np
import pytest

from repro.core.betweenness import betweenness_exact, betweenness_spark
from repro.core.graph import build_graph
from repro.graph.csr import csr_from_arrays, csr_from_edges
from repro.lakes.datalake import lake_from_tables
from tests.fixtures import EXAMPLE31_TABLES


def _random_csr(n=40, m=120, seed=3):
    rng = np.random.default_rng(seed)
    src = rng.integers(0, n, m)
    dst = rng.integers(0, n, m)
    keep = src != dst
    return csr_from_arrays(src[keep], dst[keep], n)


def _collect(df, n):
    out = np.zeros(n)
    for r in df.collect():
        out[r["node_id"]] = r["bc"]
    return out


def test_spark_exact_matches_kernel(spark):
    csr = _random_csr()
    got = _collect(betweenness_spark(spark, csr, normalized=True), csr.n)
    ref = betweenness_exact(csr, normalized=True)
    assert np.allclose(got, ref, atol=1e-12)


def test_spark_exact_raw_matches_kernel(spark):
    csr = _random_csr(seed=4)
    got = _collect(betweenness_spark(spark, csr, normalized=False), csr.n)
    ref = betweenness_exact(csr, normalized=False)
    assert np.allclose(got, ref, atol=1e-12)


def test_all_sources_sampled_equals_exact(spark):
    csr = _random_csr(seed=5)
    got = _collect(betweenness_spark(spark, csr, n_samples=csr.n, seed=0), csr.n)
    ref = betweenness_exact(csr, normalized=True)
    assert np.allclose(got, ref, atol=1e-12)


def test_explicit_sources_subset(spark):
    csr = _random_csr(seed=6)
    # half the sources, explicitly: estimator = (n/s)·partial sums.
    sources = list(range(0, csr.n, 2))
    got = _collect(
        betweenness_spark(spark, csr, sources=sources, normalized=False), csr.n
    )
    from repro.core.betweenness import brandes_dependencies

    partial = np.zeros(csr.n)
    for s in sources:
        partial += brandes_dependencies(csr.indptr, csr.indices, s)
    assert np.allclose(got, partial * (csr.n / len(sources)), atol=1e-9)


def test_sampled_ranking_correlates_with_exact(spark):
    csr = _random_csr(n=120, m=400, seed=7)
    exact = betweenness_exact(csr, normalized=True)
    approx = _collect(betweenness_spark(spark, csr, n_samples=60, seed=1), csr.n)
    # Spearman rank correlation, computed by hand to avoid scipy import
    # issues: correlation of rank vectors.
    def ranks(x):
        order = np.argsort(x)
        r = np.empty_like(order, dtype=float)
        r[order] = np.arange(len(x))
        return r

    rho = np.corrcoef(ranks(exact), ranks(approx))[0, 1]
    assert rho > 0.7


def test_figure1_subgraph_bc_ordering(spark):
    """Paper Example 3.6: BC(Jaguar) ≫ BC(Puma) > BC(Toyota)=BC(Panda)."""
    g = build_graph(
        lake_from_tables(spark, EXAMPLE31_TABLES), prune_unique=False
    )
    csr = csr_from_edges(g.edges, g.n_nodes)
    bc = betweenness_exact(csr, normalized=True)
    labels = {r.label: r.node_id for r in g.value_nodes().collect()}
    jag, puma = bc[labels["JAGUAR"]], bc[labels["PUMA"]]
    toyota, panda = bc[labels["TOYOTA"]], bc[labels["PANDA"]]
    assert jag > 5 * puma  # paper: 0.025 vs 0.003
    assert puma > toyota
    assert toyota == pytest.approx(panda)
    # single-attribute values have zero BC
    for v in ("LEMUR", "PELICAN", "APPLE", "FIAT"):
        assert bc[labels[v]] == pytest.approx(0.0)


def test_parallelism_param_stable(spark):
    csr = _random_csr(seed=8)
    a = _collect(betweenness_spark(spark, csr, parallelism=1), csr.n)
    b = _collect(betweenness_spark(spark, csr, parallelism=8), csr.n)
    assert np.allclose(a, b, atol=1e-12)


def test_empty_sources_yields_empty(spark):
    csr = _random_csr(seed=9)
    out = betweenness_spark(spark, csr, sources=[], normalized=False)
    assert out.count() == 0
