#!/usr/bin/env python
"""T28 (Fig 28): reference-data scale-out (ref 1–4X with 6–24 nodes).

Run: ``spark-submit jobs/fig28_ref_scaleout.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t28_refscale  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig28-ref-scaleout")
    try:
        df = t28_refscale.run(spark, quick=args.quick)
        md = format_table(df, "T28 — simulated throughput, ref×cluster scale-out (rec/s)")
        print(md)
        save_result("t28", md, df)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
