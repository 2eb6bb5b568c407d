"""Benchmark: §5.5 / Fig. 10 — D4 domain-count inflation as homographs
are injected (paper: monotone growth; per-column assignments inflate)."""


def test_bench_d4_impact(spark, benchmark):
    from repro.eval.experiments import d4_impact

    out = benchmark.pedantic(
        lambda: d4_impact(
            spark, sf=0.25, injections=(0, 50, 150), meanings=(2,)
        ),
        rounds=1,
        iterations=1,
    )
    m2 = out[out.meanings == 2].set_index("n_injected")
    assert m2.loc[150, "n_domains"] > m2.loc[0, "n_domains"]
    assert m2.loc[150, "avg_per_col"] >= m2.loc[0, "avg_per_col"]
