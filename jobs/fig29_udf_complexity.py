#!/usr/bin/env python
"""T29 (Fig 29): complex-UDF throughput vs batch size (measured).

Run: ``spark-submit jobs/fig29_udf_complexity.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t29_complexity  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig29-udf-complexity")
    try:
        df = t29_complexity.run(spark, quick=args.quick)
        md = format_table(df, "T29 — complex-UDF enrichment throughput (rec/s)")
        print(md)
        save_result("t29", md, df)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
