"""Benchmark fixtures: single-shot pedantic runs of each table harness.

Table harnesses are end-to-end experiments (minutes, not microseconds),
so every benchmark runs exactly once (rounds=1, iterations=1) and the
rendered table is printed into the benchmark log for EXPERIMENTS.md.
"""
from __future__ import annotations

import pytest

from repro.harness.tables import TableResult, format_table


@pytest.fixture
def run_table(benchmark, capsys):
    def run(fn, spark, **kwargs) -> TableResult:
        result = benchmark.pedantic(
            lambda: fn(spark, **kwargs), rounds=1, iterations=1, warmup_rounds=0
        )
        with capsys.disabled():
            print("\n" + format_table(result), flush=True)
        return result

    return run
