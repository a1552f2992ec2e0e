"""Integration tests for the end-to-end entity group matching pipeline."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.pipeline import (candidate_pairs, full_assignment,
                                 run_group_matching)
from repro.matching import model as M


@pytest.fixture(scope="module")
def company_model(companies_df):
    return M.train(companies_df, "companies", M.MODELS["distilbert128_all"],
                   seed=0)


@pytest.fixture(scope="module")
def company_result(companies_df, securities_df, company_model):
    return run_group_matching(companies_df, "companies", company_model,
                              gamma=25, mu=5, securities=securities_df)


class TestCandidatePairs:
    def test_companies_have_provenance_flag(self, companies_df,
                                            securities_df):
        cands = candidate_pairs("companies", companies_df,
                                securities=securities_df)
        assert set(cands.columns) == {"src", "dst", "from_token_overlap"}
        flags = {r["from_token_overlap"] for r in
                 cands.select("from_token_overlap").distinct().collect()}
        assert True in flags and False in flags

    def test_securities_use_issuer_and_ids(self, securities_df,
                                           gt_company_groups):
        cands = candidate_pairs("securities", securities_df,
                                company_groups=gt_company_groups)
        assert cands.count() > 0
        assert {r["from_token_overlap"] for r in
                cands.select("from_token_overlap").distinct().collect()} == {False}

    def test_products_token_only(self, wdc_df):
        cands = candidate_pairs("products", wdc_df)
        assert cands.count() > 0

    def test_unknown_kind_raises(self, companies_df):
        with pytest.raises(ValueError):
            candidate_pairs("nope", companies_df)

    def test_candidate_recall_covers_most_gt(self, companies_df,
                                             securities_df):
        """Blocking must surface most true pairs (paper: recall drop from
        blocking is moderate)."""
        from repro.metrics.pairs import pairwise_scores
        cands = candidate_pairs("companies", companies_df,
                                securities=securities_df)
        s = pairwise_scores(cands, companies_df)
        assert s["recall"] > 0.6


class TestFullAssignment:
    def test_covers_every_record(self, companies_df, company_result):
        asg = company_result.assignment
        assert asg.count() == companies_df.count()

    def test_singletons_self_grouped(self, spark, companies_df):
        asg = full_assignment(
            companies_df,
            spark.createDataFrame(pd.DataFrame({"id": [], "group": []}),
                                  schema="id long, group long"))
        rows = asg.collect()
        assert all(r["id"] == r["group"] for r in rows)


class TestEndToEnd:
    def test_stage_scores_present(self, company_result):
        for d in (company_result.pairwise, company_result.pre_cleanup,
                  company_result.post_cleanup):
            assert {"precision", "recall", "f1"} <= set(d)
        assert "purity" in company_result.pre_cleanup
        assert "purity" in company_result.post_cleanup

    def test_cleanup_restores_precision(self, company_result):
        """The paper's central claim: Post Graph Cleanup precision far above
        Pre Graph Cleanup precision."""
        assert (company_result.post_cleanup["precision"]
                > company_result.pre_cleanup["precision"] + 0.1)
        assert company_result.post_cleanup["precision"] > 0.9

    def test_pre_cleanup_recall_at_least_pairwise(self, company_result):
        """Transitive closure only adds predicted pairs."""
        assert (company_result.pre_cleanup["recall"]
                >= company_result.pairwise["recall"] - 1e-9)

    def test_purity_improves_post_cleanup(self, company_result):
        assert (company_result.post_cleanup["purity"]
                >= company_result.pre_cleanup["purity"])

    def test_group_sizes_bounded_by_mu(self, company_result):
        sizes = (company_result.assignment.groupBy("group").count()
                 .agg(F.max("count")).first()[0])
        assert sizes <= 5

    def test_inference_time_recorded(self, company_result):
        assert company_result.inference_seconds > 0
        assert company_result.n_candidates > 0

    def test_securities_pipeline_with_company_assignment(
            self, securities_df, company_result):
        model = M.train(securities_df, "securities",
                        M.MODELS["distilbert128_all"], seed=0)
        res = run_group_matching(securities_df, "securities", model,
                                 gamma=25, mu=5,
                                 company_groups=company_result.assignment)
        assert res.post_cleanup["f1"] > 0.5
        assert res.post_cleanup["precision"] > 0.8

    def test_transitive_discovery_of_no_id_groups(self, spark,
                                                  securities_df,
                                                  gt_company_groups):
        """Securities whose identifiers were wiped (NoIdOverlaps) can only
        be matched through the Issuer Match blocking — the paper's
        transitivity argument. With gt company groups, the pipeline must
        recover a decent share of their pairs."""
        model = M.train(securities_df, "securities",
                        M.MODELS["distilbert128_all"], seed=0)
        res = run_group_matching(securities_df, "securities", model,
                                 gamma=25, mu=5,
                                 company_groups=gt_company_groups)
        hard = securities_df.where(~F.col("easy_group")
                                   & ~F.col("acq_involved"))
        if hard.count() < 4:
            pytest.skip("no hard groups in tiny dataset")
        from repro.metrics.pairs import closure_scores
        hard_scores = closure_scores(
            res.assignment.join(
                hard.select(F.col("record_id").alias("id")), "id"),
            hard)
        assert hard_scores["recall"] > 0.2

    def test_wdc_pipeline_runs(self, wdc_df):
        model = M.train(wdc_df, "products", M.MODELS["distilbert128_all"],
                        seed=0)
        res = run_group_matching(wdc_df, "products", model, gamma=25, mu=5)
        assert res.post_cleanup["precision"] >= res.pre_cleanup["precision"]

    def test_wdc_cleanup_chops_large_groups(self, wdc_df):
        """Heterogeneous group sizes + fixed mu → post-cleanup recall drops
        below pre-cleanup recall (the paper's WDC finding)."""
        model = M.train(wdc_df, "products", M.MODELS["distilbert128_all"],
                        seed=0)
        res = run_group_matching(wdc_df, "products", model, gamma=25, mu=5)
        assert res.post_cleanup["recall"] < res.pre_cleanup["recall"]
