"""Benchmark: regenerate Table I at the EXPERIMENTS.md scale.

Run with ``pytest benchmarks/bench_table1.py --benchmark-only``. The measured
table is printed past pytest's capture (so it lands in bench_output.txt) and
written to ``benchmarks/results/``.
"""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).parent))
from _capture import emit  # noqa: E402

from repro.experiments import BENCH_WORLD, table1  # noqa: E402


@pytest.mark.benchmark(group="table1", min_rounds=1, max_time=1)
def test_bench_table1_trmp(spark, benchmark, capsys):
    df = benchmark.pedantic(table1, args=(spark, BENCH_WORLD), rounds=1, iterations=1)
    emit(capsys, "Table I: Metrics of each stage (measured)", df)
    assert len(df) == 4
