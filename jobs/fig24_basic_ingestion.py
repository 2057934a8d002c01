#!/usr/bin/env python
"""T24 (Fig 24): basic ingestion — measured local rows + simulated sweep.

Run: ``spark-submit jobs/fig24_basic_ingestion.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t24_basic  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig24-basic-ingestion")
    try:
        measured = t24_basic.run_measured(spark, quick=args.quick)
        md = format_table(measured, "T24a — measured local throughput (no UDF)")
        print(md)
        save_result("t24_measured", md, measured)

        sim = t24_basic.run_simulated(spark)
        md = format_table(sim, "T24b — simulated cluster sweep (rec/s)")
        print("\n" + md)
        save_result("t24_simulated", md, sim)

        rates = t24_basic.run_refresh_rates(spark)
        md = format_table(
            rates, "T24c — refresh rates at 24 nodes (paper: 68/27/10 jobs/s)"
        )
        print("\n" + md)
        save_result("t24_refresh_rates", md, rates)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
