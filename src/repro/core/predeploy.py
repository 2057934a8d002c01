"""Parameterized predeployed jobs (§ 5.1).

AsterixDB compiles the computing job's query once, distributes the job
specification to every node, and thereafter sends only an invocation
message with the new batch as parameter — a prepared-query analogue that
avoids per-batch compile + distribution cost.

Spark mapping: a :class:`PredeployedJob` builds the enrichment closure
once at ``deploy()`` (including resolving the reference-side plan
template against the store schemas — Catalyst analysis of the full
multi-join plan); each ``invoke(batch)`` only substitutes the batch
parameter and executes. The un-predeployed baseline (:class:`AdhocJob`)
rebuilds the closure *and* re-runs Catalyst analysis of the whole plan
on every invocation, which is the compile work predeployment removes.

Mapping limits (DESIGN.md § 7): Spark re-plans the physical execution at
every action regardless, so the measurable predeploy saving here is the
repeated analysis/closure construction, not job-spec shipping — the same
*kind* of overhead, smaller in absolute terms than AsterixDB's.
"""
import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.enrich.udfs import EnrichmentUdf


class PredeployedJob:
    """Compile once, invoke per batch with the batch as the parameter."""

    def __init__(self, spark: SparkSession, udf: EnrichmentUdf, ref_provider):
        """``ref_provider()`` returns ``{name: Spark DataFrame}`` — the
        *current* reference snapshots. Dynamic ingestion passes a provider
        that re-snapshots the LSM stores; static ingestion passes one
        returning frozen cached frames."""
        self.spark = spark
        self.udf = udf
        self._ref_provider = ref_provider
        self.compile_s = 0.0
        self.deployed = False

    def deploy(self) -> None:
        """Compile + distribute: resolve the plan template once."""
        t0 = time.perf_counter()
        refs = self._ref_provider()
        probe = self.spark.createDataFrame(_probe_batch())
        plan = self.udf.transform(self.spark, probe, refs)
        _ = plan.schema  # force Catalyst analysis of the full join plan
        self.compile_s += time.perf_counter() - t0
        self.deployed = True

    def invoke(self, batch_pdf: pd.DataFrame) -> pd.DataFrame:
        """One computing-job invocation: parameter in, enriched rows out."""
        if not self.deployed:
            raise RuntimeError("deploy() before invoke()")
        refs = self._ref_provider()
        batch_df = self.spark.createDataFrame(batch_pdf)
        return self.udf.transform(self.spark, batch_df, refs).toPandas()


class AdhocJob:
    """Baseline without predeployment: full compile on every invocation."""

    def __init__(self, spark: SparkSession, udf: EnrichmentUdf, ref_provider):
        self.spark = spark
        self.udf = udf
        self._ref_provider = ref_provider
        self.compile_s = 0.0

    def invoke(self, batch_pdf: pd.DataFrame) -> pd.DataFrame:
        t0 = time.perf_counter()
        refs = self._ref_provider()
        batch_df = self.spark.createDataFrame(batch_pdf)
        plan = self.udf.transform(self.spark, batch_df, refs)
        _ = plan.schema  # per-batch Catalyst analysis — the cost predeploy avoids
        self.compile_s += time.perf_counter() - t0
        return plan.toPandas()


def _probe_batch() -> pd.DataFrame:
    """A one-row batch with the tweet schema, for plan compilation."""
    from repro import synth_data

    return synth_data.tweets_pdf(1, seed=0)
