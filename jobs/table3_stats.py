"""Reproduce Table 3: statistics of the (synthetic stand-in) datasets.

Prints one row per dataset with measured |V|, |E|, average degree and
increment count next to the paper's published figures. Run with
``spark-submit jobs/table3_stats.py`` or ``python jobs/table3_stats.py``.
"""
from __future__ import annotations

import argparse

import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets import PRESETS, load_preset
from repro.datasets.stats import stats_row


def run(spark: SparkSession, scale: float = 1.0, names=None) -> pd.DataFrame:
    """Compute the Table 3 rows; paper columns joined for side-by-side diff."""
    rows = []
    for name in names or list(PRESETS):
        p = PRESETS[name]
        data = load_preset(name, scale=scale)
        r = stats_row(spark, data)
        r.update(
            paper_V=p.paper_v,
            paper_E=p.paper_e,
            paper_avg_degree=p.paper_avg_deg,
            paper_increments=p.paper_increments,
            type=p.type_label,
        )
        rows.append(r)
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--datasets", nargs="*", default=None)
    args = ap.parse_args()
    spark = (
        SparkSession.builder.appName("spade-table3")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    try:
        df = run(spark, scale=args.scale, names=args.datasets)
        print("\n== Table 3: dataset statistics (measured vs paper) ==")
        print(df.to_string(index=False))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
