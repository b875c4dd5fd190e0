#!/usr/bin/env python
"""Reproduce Table II (AUC/ACC of ALPC vs baselines on datasets A/B/C).

    spark-submit jobs/table2_alpc.py        # or: python jobs/table2_alpc.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments import BENCH_WORLD, table2  # noqa: E402


def main() -> None:
    spark = get_spark()
    df = table2(spark, BENCH_WORLD)
    print("\nTable II: Performance comparison on offline datasets\n")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
