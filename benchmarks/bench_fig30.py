"""T30 (Fig 30) benchmark: calibrate + compute 24-vs-6 speed-ups."""
import pytest

from repro.experiments import t30_speedup


@pytest.mark.benchmark(group="t30-speedup")
def test_bench_t30(benchmark, spark):
    df = benchmark.pedantic(
        lambda: t30_speedup.run(
            spark, quick=True,
            udf_names=["safety_rating", "fuzzy_suspects", "tweet_context"],
        ),
        rounds=1, iterations=1,
    )
    assert (df["speedup_16X"] > 0).all()
