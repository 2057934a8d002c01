"""T31 (Fig 31): ingestion scale-out of the complex UDFs, 6–24 nodes.

Paper: 100K tweets, 16X batches; the four complex UDFs plus Naive
Nearby Monuments (index disabled by hint). Gains level off as cluster
overhead grows; indexed Nearby Monuments is capped by its probe
broadcast while the naive variant starts far lower but scales steadily
as the monument list is split across more nodes. Simulated over
calibrated costs (DESIGN.md § 4).
"""
import pandas as pd
from pyspark.sql import SparkSession

from repro.cluster.simulator import SimulatedCluster
from repro.experiments.calibration import run_calibration
from repro.experiments.common import BATCH_SIZES

UDF_NAMES = [
    "nearby_monuments", "naive_nearby_monuments", "suspicious_names",
    "tweet_context", "worrisome_tweets",
]
NODES = (6, 12, 18, 24)


def run(spark: SparkSession, *, quick: bool = False,
        udf_names=None) -> pd.DataFrame:
    names = list(udf_names or UDF_NAMES)
    cal, costs = run_calibration(spark, udf_names=names, quick=quick)
    batch = BATCH_SIZES["16X"]
    rows = []
    for n in NODES:
        c = SimulatedCluster(n, cal)
        row = {"nodes": n}
        for name in names:
            row[name] = c.enrich_throughput(costs[name], batch)
        rows.append(row)
    return pd.DataFrame(rows)
