"""T28 (Fig 28) benchmark: calibrate + simulate the ref scale-out sweep."""
import pytest

from repro.experiments import t28_refscale


@pytest.mark.benchmark(group="t28-ref-scaleout")
def test_bench_t28(benchmark, spark):
    df = benchmark.pedantic(
        lambda: t28_refscale.run(
            spark, quick=True,
            udf_names=["safety_rating", "largest_religions"],
        ),
        rounds=1, iterations=1,
    )
    assert len(df) == len(t28_refscale.STEPS)
