"""T24 (Fig 24) benchmarks: basic ingestion, measured + simulated."""
import pytest

from repro.experiments import t24_basic


@pytest.mark.benchmark(group="t24")
def test_bench_t24_measured_pipelines(benchmark, spark):
    """Real static vs dynamic pipelines moving 4K tweets (no UDF)."""
    df = benchmark.pedantic(
        lambda: t24_basic.run_measured(spark, quick=True),
        rounds=1, iterations=1,
    )
    assert (df["throughput_rec_s"] > 0).all()


@pytest.mark.benchmark(group="t24")
def test_bench_t24_simulated_sweep(benchmark, spark):
    """Calibrate machine constants + compute the 1–24 node sweep."""
    df = benchmark.pedantic(
        lambda: t24_basic.run_simulated(spark), rounds=1, iterations=1
    )
    assert df["static"].nunique() == 1  # single-intake static stays flat
