"""Benchmark fixtures: shared quick-scale workbench and batches.

Benchmarks run the same harnesses as ``jobs/`` in their ``quick``
configurations, one benchmark per paper table, with
``benchmark.pedantic(rounds=1)`` so the suite stays minutes-scale; the
full-scale tables are produced by the ``jobs/`` entrypoints
(EXPERIMENTS.md records both).
"""
import pytest

from repro import synth_data
from repro.experiments.common import Workbench

BENCH_QUICK_REF_SCALE = 0.02


@pytest.fixture(scope="session")
def bench_workbench(spark):
    """All reference stores at quick scale, shared across benchmarks."""
    wb = Workbench(
        spark, tuple(synth_data.REFERENCE_GENERATORS),
        ref_scale=BENCH_QUICK_REF_SCALE,
    )
    yield wb
    wb.close()


@pytest.fixture(scope="session")
def batch_420(spark):
    pdf = synth_data.tweets_pdf(420, seed=7)
    return pdf
