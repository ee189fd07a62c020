"""Reproduces paper Table 1: characteristics of the four datasets.

Usage: python jobs/table1_datasets.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))
from jobs._cli import parse_args  # noqa: E402


def main(spark, sf: float):
    from repro.harness import fmt_table, table1_rows

    rows = table1_rows(spark, sf)
    print(f"\n# Table 1 — dataset characteristics (SF={sf})")
    print(fmt_table(rows))
    return rows


if __name__ == "__main__":
    args = parse_args(__doc__)
    from repro.harness import make_spark

    spark = make_spark("table1")
    main(spark, args.sf)
    spark.stop()
