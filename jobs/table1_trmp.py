#!/usr/bin/env python
"""Reproduce Table I (metrics of each TRMP stage).

    spark-submit jobs/table1_trmp.py        # or: python jobs/table1_trmp.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments import BENCH_WORLD, table1  # noqa: E402


def main() -> None:
    spark = get_spark()
    df = table1(spark, BENCH_WORLD)
    print("\nTable I: Metrics of each stage\n")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
