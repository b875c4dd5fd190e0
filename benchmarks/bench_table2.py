"""Benchmark: regenerate Table II at the EXPERIMENTS.md scale."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).parent))
from _capture import emit  # noqa: E402

from repro.experiments import BENCH_WORLD, table2  # noqa: E402


@pytest.mark.benchmark(group="table2", min_rounds=1, max_time=1)
def test_bench_table2_methods(spark, benchmark, capsys):
    df = benchmark.pedantic(table2, args=(spark, BENCH_WORLD), rounds=1, iterations=1)
    emit(capsys, "Table II: Performance comparison on offline datasets (measured)", df)
    assert len(df) == 11  # meta row + 10 methods
