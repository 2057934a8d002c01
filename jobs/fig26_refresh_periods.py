#!/usr/bin/env python
"""T26 (Fig 26): Dynamic SQL++ refresh periods per batch size.

Reuses ``results/t25.csv`` when present (T26 is a view of the T25 runs);
otherwise re-runs the dynamic SQL++ measurements.
Run: ``spark-submit jobs/fig26_refresh_periods.py [--quick]``
"""
import os
import sys

import pandas as pd

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import get_spark, parse_args  # noqa: E402

from repro.experiments import t25_udf  # noqa: E402
from repro.experiments.common import (  # noqa: E402
    format_table, results_dir, save_result,
)


def main() -> None:
    args = parse_args(__doc__)
    cached = os.path.join(results_dir(), "t25.csv")
    if os.path.exists(cached):
        df = pd.read_csv(cached)
    else:
        spark = get_spark("fig26-refresh-periods")
        try:
            df = t25_udf.run(spark, quick=args.quick)
        finally:
            spark.stop()
    periods = t25_udf.refresh_periods(df)
    md = format_table(
        periods, "T26 — Dynamic SQL++ refresh period (s/batch)",
        floatfmt="{:.3f}",
    )
    print(md)
    save_result("t26", md, periods)


if __name__ == "__main__":
    main()
