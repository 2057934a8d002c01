#!/usr/bin/env python
"""T25 (Fig 25): enrichment throughput — static/dynamic × Java/SQL++ × batch.

Also saves T26 (Fig 26, refresh periods), which is a view of the same runs.
Run: ``spark-submit jobs/fig25_udf_enrichment.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t25_udf  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig25-udf-enrichment")
    try:
        df = t25_udf.run(spark, quick=args.quick)
        md = format_table(
            df, "T25 — 6-node-scale enrichment throughput (rec/s)"
        )
        print(md)
        save_result("t25", md, df)

        periods = t25_udf.refresh_periods(df)
        md = format_table(
            periods, "T26 — Dynamic SQL++ refresh period (s/batch)",
            floatfmt="{:.3f}",
        )
        print("\n" + md)
        save_result("t26", md, periods)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
