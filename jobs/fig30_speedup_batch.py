#!/usr/bin/env python
"""T30 (Fig 30): 24-vs-6-node speed-up per UDF per batch size (simulated).

Run: ``spark-submit jobs/fig30_speedup_batch.py [--quick]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t30_speedup  # noqa: E402
from repro.experiments.common import format_table, save_result  # noqa: E402


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("fig30-speedup")
    try:
        df = t30_speedup.run(spark, quick=args.quick)
        md = format_table(
            df, "T30 — speed-up 24 vs 6 nodes per batch size",
            floatfmt="{:.2f}",
        )
        print(md)
        save_result("t30", md, df)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
