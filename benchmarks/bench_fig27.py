"""T27 (Fig 27) benchmarks: enrichment with vs without reference updates."""
import pytest

from repro.experiments import t27_updates


@pytest.mark.benchmark(group="t27-updates")
@pytest.mark.parametrize("rate", [0, 400])
def test_bench_t27_update_rate(benchmark, spark, rate):
    df = benchmark.pedantic(
        lambda: t27_updates.run(
            spark, quick=True, udf_names=["safety_rating"], rates=(rate,)
        ),
        rounds=1, iterations=1,
    )
    assert df["throughput_rec_s"].iloc[0] > 0
