"""Benchmark: Table 3 — injected-homograph recovery vs number of
meanings (paper: 97.5% at m=2 rising to 100% at m≥6)."""


def test_bench_table3_meanings(spark, benchmark):
    from repro.eval.experiments import table3_meanings

    out = benchmark.pedantic(
        lambda: table3_meanings(
            spark, sf=0.35, runs=2, meanings=(2, 4, 8), n_samples=800
        ),
        rounds=1,
        iterations=1,
    )
    by_m = out.set_index("meanings")["pct_in_topn"]
    assert by_m[8] >= by_m[2] - 5.0
    assert by_m[8] >= 90.0
