#!/usr/bin/env python
"""T31 (Fig 31): complex-UDF throughput vs cluster size (simulated).

Run: ``spark-submit jobs/fig31_ingest_scaleout.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t31_scaleout  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig31-ingest-scaleout")
    try:
        df = t31_scaleout.run(spark, quick=args.quick)
        md = format_table(df, "T31 — simulated throughput vs cluster size (rec/s)")
        print(md)
        save_result("t31", md, df)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
