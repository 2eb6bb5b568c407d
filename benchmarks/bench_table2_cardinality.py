"""Benchmark: Table 2 — injected-homograph recovery vs cardinality
threshold (paper: 85% at >0 rising to 97.5% at ≥500)."""


def test_bench_table2_cardinality(spark, benchmark):
    from repro.eval.experiments import table2_cardinality

    out = benchmark.pedantic(
        lambda: table2_cardinality(
            spark, sf=0.35, runs=2, thresholds=(0, 250, 500), n_samples=800
        ),
        rounds=1,
        iterations=1,
    )
    by_thr = out.set_index("threshold")["pct_in_topn"]
    # the high-cardinality setting must not be worse than the low one
    assert by_thr[500] >= by_thr[0] - 5.0
    assert by_thr[500] >= 80.0
