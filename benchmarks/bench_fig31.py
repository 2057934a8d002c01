"""T31 (Fig 31) benchmark: calibrate + simulate the cluster-size sweep."""
import pytest

from repro.experiments import t31_scaleout


@pytest.mark.benchmark(group="t31-scaleout")
def test_bench_t31(benchmark, spark):
    df = benchmark.pedantic(
        lambda: t31_scaleout.run(
            spark, quick=True,
            udf_names=["nearby_monuments", "naive_nearby_monuments"],
        ),
        rounds=1, iterations=1,
    )
    assert list(df["nodes"]) == list(t31_scaleout.NODES)
