"""Benchmark for Table 1: dataset generation + distributed statistics."""
import pytest

from repro.tables.table1 import run_table1


@pytest.mark.benchmark(group="table1")
def test_bench_table1_stats(benchmark, bench_datasets):
    rows = benchmark.pedantic(
        lambda: run_table1(bench_datasets), rounds=1, iterations=1)
    assert len(rows) == 4
    for name, stats in rows:
        assert stats["n_matches"] > 0
