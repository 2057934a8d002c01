"""Storage job sink.

The paper's storage job receives enriched frames through an active
partition holder, hash-partitions them by primary key, and writes them
into the dataset's storage partitions. Here the sink hash-partitions by
key into a fixed number of buckets (mirroring AsterixDB's hash
partitioner) and appends parquet — one append per pushed batch, so
storage cost is on the measured path exactly as in the paper.
"""
import os
import threading

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


class StorageSink:
    """Append-only enriched-dataset writer, hash-partitioned by key."""

    def __init__(self, spark: SparkSession, path: str, key: str,
                 n_partitions: int = 8):
        self.spark = spark
        self.path = path
        self.key = key
        self.n_partitions = n_partitions
        self._lock = threading.Lock()
        self._rows_written = 0
        self._batches_written = 0
        os.makedirs(path, exist_ok=True)

    def append(self, batch) -> int:
        """Write one enriched batch (Spark or pandas frame); returns rows."""
        df = (
            batch
            if isinstance(batch, DataFrame)
            else self.spark.createDataFrame(batch)
        )
        df = df.withColumn(
            "_bucket", F.pmod(F.hash(F.col(self.key)), F.lit(self.n_partitions))
        )
        # Persist so the (possibly expensive) upstream enrichment plan is
        # evaluated once for both the write and the row count.
        df = df.persist()
        try:
            df.write.mode("append").partitionBy("_bucket").parquet(self.path)
            n = df.count()
        finally:
            df.unpersist()
        with self._lock:
            self._rows_written += n
            self._batches_written += 1
        return n

    def append_pdf_local(self, pdf: pd.DataFrame) -> int:
        """Driver-local parquet append for high-frequency small batches.

        Same storage semantics (hash bucket column, parquet append) but
        without a Spark job per batch — used where the measured quantity
        is the enrichment pipeline, not the sink.
        """
        pdf = pdf.copy()
        pdf["_bucket"] = pd.util.hash_pandas_object(
            pdf[self.key], index=False
        ).astype("int64") % self.n_partitions
        out = os.path.join(self.path, f"local-{self._batches_written:06d}.parquet")
        # pandas defaults to nanosecond timestamps, which Spark's parquet
        # reader rejects (PARQUET_TYPE_ILLEGAL) — write microseconds.
        pdf.to_parquet(
            out, coerce_timestamps="us", allow_truncated_timestamps=True
        )
        with self._lock:
            self._rows_written += len(pdf)
            self._batches_written += 1
        return len(pdf)

    @property
    def rows_written(self) -> int:
        with self._lock:
            return self._rows_written

    @property
    def batches_written(self) -> int:
        with self._lock:
            return self._batches_written

    def read(self) -> DataFrame:
        """Read back everything written so far (both append paths)."""
        return self.spark.read.parquet(self.path)
