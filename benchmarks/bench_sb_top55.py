"""Benchmark: §5.1 — SB top-55 precision for BC / LCC / D4.

Paper: BC 69%, D4 38%, LCC ineffective. The shape requirement is
BC ≥ D4 and BC ≥ LCC.
"""


def test_bench_sb_top55(spark, benchmark):
    from repro.eval.experiments import sb_top55

    out = benchmark.pedantic(
        lambda: sb_top55(spark, scale=0.3), rounds=1, iterations=1
    )
    assert out["bc"]["precision"] >= out["d4"]["precision"]
    assert out["bc"]["precision"] >= out["lcc"]["precision"]
    assert out["bc"]["precision"] >= 0.69  # at least the paper's level
