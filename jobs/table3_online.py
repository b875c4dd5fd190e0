#!/usr/bin/env python
"""Reproduce Table III (online A/B testing of the EGL System).

    spark-submit jobs/table3_online.py      # or: python jobs/table3_online.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments import BENCH_WORLD, table3  # noqa: E402


def main() -> None:
    spark = get_spark()
    df = table3(spark, BENCH_WORLD)
    print("\nTable III: Online experiments performance\n")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
