"""T30 (Fig 30): 24-node vs 6-node speed-up per UDF per batch size.

Paper: 100K tweets; speed-up of every use-case UDF at 1X/4X/16X.
Simple UDFs (Q1–Q3) speed up poorly (overhead-dominated); Nearby
Monuments is limited by its INLJ broadcast; Tweet Context exceeds the
ideal 4× because added memory also removes join spill. Simulated over
calibrated costs (DESIGN.md § 4).
"""
import pandas as pd
from pyspark.sql import SparkSession

from repro.cluster.simulator import SimulatedCluster
from repro.enrich import udfs
from repro.experiments.calibration import run_calibration
from repro.experiments.common import BATCH_SIZES

UDF_NAMES = [u.name for u in udfs.ALL_UDFS]


def run(spark: SparkSession, *, quick: bool = False,
        udf_names=None) -> pd.DataFrame:
    names = list(udf_names or UDF_NAMES)
    cal, costs = run_calibration(spark, udf_names=names, quick=quick)
    rows = []
    for name in names:
        row = {"udf": name}
        for label, bs in BATCH_SIZES.items():
            hi = SimulatedCluster(24, cal).enrich_throughput(costs[name], bs)
            lo = SimulatedCluster(6, cal).enrich_throughput(costs[name], bs)
            row[f"speedup_{label}"] = hi / lo
        rows.append(row)
    return pd.DataFrame(rows)
