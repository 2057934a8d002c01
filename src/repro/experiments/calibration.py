"""Calibration orchestration for the simulated-cluster tables (T24/28/30/31).

Calibrates the machine constants and every UDF's cost decomposition at
the benchmark reference scale, caching results as JSON in ``results/``
so the sweep jobs can re-run without re-measuring.
"""
import json
import os

from pyspark.sql import SparkSession

from repro.cluster.calibrate import (
    Calibration, UdfCost, calibrate_machine, calibrate_udf, make_ref_pdfs,
)
from repro.enrich import udfs
from repro.experiments.common import (
    BENCH_DISTRICT_REF_SCALE, BENCH_REF_SCALE, results_dir,
)

#: Per-UDF fit batch sizes. The naive monument scan is quadratic in
#: |batch| × |monuments|, so its fit uses small batches (slope is linear
#: in batch size regardless of where it is sampled).
FIT_BATCHES = {"naive_nearby_monuments": (105, 420)}
DEFAULT_FIT = (420, 1680)

CACHE_FILE = "calibration.json"


def _cache_path() -> str:
    return os.path.join(results_dir(), CACHE_FILE)


def load_cached() -> tuple | None:
    try:
        with open(_cache_path()) as f:
            d = json.load(f)
        cal = Calibration(**d["machine"])
        costs = {k: UdfCost.from_dict(v) for k, v in d["udfs"].items()}
        return cal, costs
    except (OSError, KeyError, TypeError, json.JSONDecodeError):
        return None


def run_calibration(spark: SparkSession, *, udf_names=None, quick: bool = False,
                    use_cache: bool = True):
    """Measure (or load) machine + per-UDF cost constants.

    ``quick`` shrinks reference scale and reps for the benchmark suite.
    Returns ``(Calibration, {udf_name: UdfCost})``.
    """
    names = list(udf_names or udfs.BY_NAME)
    cached = load_cached() if (use_cache and not quick) else None
    if cached is not None and set(names) <= set(cached[1]):
        return cached[0], {n: cached[1][n] for n in names}

    ref_scale = 0.02 if quick else BENCH_REF_SCALE
    district_scale = 0.04 if quick else BENCH_DISTRICT_REF_SCALE
    reps = 1 if quick else 3
    # merge into any existing cache: keep its machine constants and
    # already-calibrated UDFs, measure only what is missing
    cal = cached[0] if cached is not None else calibrate_machine(spark)
    costs = dict(cached[1]) if cached is not None else {}
    todo = [n for n in names if n not in costs]
    for name in todo:
        udf = udfs.BY_NAME[name]
        full = make_ref_pdfs(udf.refs, ref_scale, district_scale=district_scale)
        half = make_ref_pdfs(
            udf.refs, ref_scale / 2, district_scale=district_scale / 2
        )
        b_small, b_large = FIT_BATCHES.get(name, DEFAULT_FIT)
        if quick:
            b_small, b_large = max(60, b_small // 4), max(240, b_large // 4)
        costs[name] = calibrate_udf(
            spark, udf, full, half, b_small=b_small, b_large=b_large, reps=reps
        )
    if not quick:
        with open(_cache_path(), "w") as f:
            json.dump(
                {
                    "machine": json.loads(cal.to_json()),
                    "udfs": {k: v.to_dict() for k, v in costs.items()},
                },
                f, indent=2,
            )
    return cal, {n: costs[n] for n in names}
