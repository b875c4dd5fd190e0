"""Benchmark: regenerate Table III at the EXPERIMENTS.md scale."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).parent))
from _capture import emit  # noqa: E402

from repro.experiments import BENCH_WORLD, table3  # noqa: E402


@pytest.mark.benchmark(group="table3", min_rounds=1, max_time=1)
def test_bench_table3_online(spark, benchmark, capsys, tmp_path):
    df = benchmark.pedantic(
        table3,
        args=(spark, BENCH_WORLD),
        kwargs={"store_path": str(tmp_path / "gea")},
        rounds=1,
        iterations=1,
    )
    emit(capsys, "Table III: Online experiments performance (measured)", df)
    assert len(df) == 5
