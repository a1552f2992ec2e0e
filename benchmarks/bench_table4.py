"""Benchmark for Table 4: the end-to-end entity group matching pipeline.

Runs blocking → LM-surrogate scoring → connected components → GraLMatch
cleanup for the DistilBERT-ALL model on the synthetic companies dataset
(the paper's largest cell), asserting the paper's qualitative shape:
pre-cleanup precision collapse, post-cleanup recovery.
"""
import pytest

from repro.core.pipeline import run_group_matching
from repro.matching import model as M


@pytest.mark.benchmark(group="table4")
def test_bench_table4_group_matching(benchmark, bench_datasets):
    ds = bench_datasets["synthetic_companies"]
    model = M.train(ds.records, "companies", M.MODELS["distilbert128_all"],
                    seed=0)

    res = benchmark.pedantic(
        lambda: run_group_matching(ds.records, "companies", model,
                                   ds.gamma, ds.mu,
                                   securities=ds.securities),
        rounds=1, iterations=1)
    assert res.post_cleanup["precision"] > res.pre_cleanup["precision"]
    assert res.post_cleanup["precision"] > 0.9


@pytest.mark.benchmark(group="table4")
def test_bench_table4_securities(benchmark, bench_datasets):
    from pyspark.sql import functions as F
    ds = bench_datasets["synthetic_securities"]
    comp = bench_datasets["synthetic_companies"]
    gt_groups = comp.records.select(
        F.col("record_id").alias("id"), F.col("gt_group").alias("group"))
    model = M.train(ds.records, "securities", M.MODELS["distilbert128_all"],
                    seed=0)
    res = benchmark.pedantic(
        lambda: run_group_matching(ds.records, "securities", model,
                                   ds.gamma, ds.mu,
                                   company_groups=gt_groups),
        rounds=1, iterations=1)
    assert res.post_cleanup["f1"] > 0.5
