"""End-to-end DomainNet pipeline (paper Fig. 4).

(1) construct the bipartite graph from a cells relation,
(2) compute a centrality measure for every value node,
(3) rank values in the measure's homograph direction.

``measure="bc"`` is betweenness centrality (exact when
``n_samples=None``, source-sampled otherwise); ``measure="lcc"`` is the
bipartite local clustering coefficient.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.betweenness import betweenness_spark
from repro.core.graph import BipartiteGraph, build_graph
from repro.core.lcc import lcc_scores
from repro.core.ranking import MEASURE_ASCENDING, attach_labels, rank_values
from repro.graph.csr import csr_from_edges


def value_scores(
    spark: SparkSession,
    graph: BipartiteGraph,
    *,
    measure: str = "bc",
    n_samples: int | None = None,
    seed: int = 0,
    degree_weighted: bool = False,
) -> DataFrame:
    """``(label, <measure>)`` for every value node of ``graph``."""
    if measure == "bc":
        csr = csr_from_edges(graph.edges, graph.n_nodes)
        scores = betweenness_spark(
            spark, csr, n_samples=n_samples, seed=seed, degree_weighted=degree_weighted
        )
        # LCC ranks missing nodes as non-homographs via fill=1.0; for BC
        # a missing node simply has zero centrality.
        return attach_labels(graph, scores, score_col="bc", fill=0.0)
    if measure == "lcc":
        return attach_labels(graph, lcc_scores(graph), score_col="lcc", fill=1.0)
    raise ValueError(f"unknown measure {measure!r} (expected 'bc' or 'lcc')")


def rank_homographs(
    spark: SparkSession,
    cells: DataFrame,
    *,
    measure: str = "bc",
    n_samples: int | None = None,
    seed: int = 0,
    prune_unique: bool = True,
) -> tuple[BipartiteGraph, DataFrame]:
    """Full pipeline: lake cells → ranked homograph candidates.

    Returns the graph and a ``(label, <measure>, rank)`` DataFrame with
    rank 1 = strongest homograph candidate.
    """
    graph = build_graph(cells, prune_unique=prune_unique)
    labeled = value_scores(
        spark, graph, measure=measure, n_samples=n_samples, seed=seed
    )
    ranked = rank_values(
        labeled, score_col=measure, ascending=MEASURE_ASCENDING[measure]
    )
    return graph, ranked
