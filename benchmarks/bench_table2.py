"""Benchmark for Table 2: the blocking stage (candidate pair generation).

Uses ground-truth company groups for the securities Issuer Match so the
benchmark isolates blocking cost from model training (the job
``jobs/table2_blocking.py`` runs the paper-faithful version with a trained
company matching feeding Issuer Match).
"""
import pytest
from pyspark.sql import functions as F

from repro.tables.table2 import run_table2


@pytest.mark.benchmark(group="table2")
def test_bench_table2_blocking(benchmark, bench_datasets):
    gt_groups = {
        name: bench_datasets[comp].records.select(
            F.col("record_id").alias("id"), F.col("gt_group").alias("group"))
        for name, comp in (("real_securities", "real_companies"),
                           ("synthetic_securities", "synthetic_companies"))
    }
    rows = benchmark.pedantic(
        lambda: run_table2(bench_datasets, gt_groups), rounds=1, iterations=1)
    assert len(rows) == 5
    for name, blockings, n_rec, n_cand, gamma, mu in rows:
        assert n_cand > 0
