#!/usr/bin/env python
"""T27 (Fig 27): throughput under concurrent reference-data updates.

Run: ``spark-submit jobs/fig27_reference_updates.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t27_updates  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig27-reference-updates")
    try:
        df = t27_updates.run(spark, quick=args.quick)
        md = format_table(
            df, "T27 — throughput vs reference-update rate (rec/s)"
        )
        print(md)
        save_result("t27", md, df)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
