"""Benchmark: Table 1 — dataset statistics at benchmark scale."""


def test_bench_table1_stats(spark, benchmark):
    from repro.eval.experiments import table1_stats

    out = benchmark.pedantic(
        lambda: table1_stats(spark, sb_scale=0.3, tus_sf=0.2, nyc_sf=0.02),
        rounds=1,
        iterations=1,
    )
    assert set(out.dataset) == {"SB", "TUS-lite", "TUS-I (clean)", "NYC-lite"}
    assert (out.loc[out.dataset == "SB", "n_attrs"] == 39).all()
