"""Tests for dataset presets, stats, and the WDC-like product generator."""
import numpy as np
import pytest

from repro.entitygen import dataset as gen
from repro.entitygen.wdc import wdc_products


class TestGenerate:
    def test_deterministic(self):
        c1, s1 = gen.synthetic(80, seed=4)
        c2, s2 = gen.synthetic(80, seed=4)
        assert c1.equals(c2) and s1.equals(s2)

    def test_seed_changes_data(self):
        c1, _ = gen.synthetic(80, seed=4)
        c2, _ = gen.synthetic(80, seed=5)
        assert not c1.equals(c2)

    def test_scaling_linear(self):
        c1, _ = gen.synthetic(50, seed=4)
        c2, _ = gen.synthetic(200, seed=4)
        assert 2.5 < len(c2) / len(c1) < 6

    def test_real_preset_eight_sources(self):
        c, s = gen.real(100)
        assert c["source_id"].nunique() == 8
        assert s["source_id"].nunique() == 8

    def test_synthetic_preset_five_sources(self):
        c, s = gen.synthetic(100)
        assert c["source_id"].nunique() == 5
        assert s["source_id"].nunique() == 5

    def test_real_preset_fewer_hard_groups(self):
        c_r, _ = gen.real(300)
        c_s, _ = gen.synthetic(300)
        assert (~c_r["easy_group"]).mean() < (~c_s["easy_group"]).mean()

    def test_securities_reference_company_records(self):
        c, s = gen.synthetic(100)
        assert set(s["company_record_id"]) <= set(c["record_id"])


class TestStats:
    def test_keys(self):
        c, _ = gen.synthetic(60)
        st = gen.stats(c)
        assert set(st) == {"n_sources", "n_entities", "n_records",
                           "n_matches", "avg_matches_per_entity",
                           "pct_with_description"}

    def test_matches_formula(self):
        c, _ = gen.synthetic(60)
        sizes = c.groupby("gt_group").size()
        assert gen.stats(c)["n_matches"] == int(
            (sizes * (sizes - 1) // 2).sum())

    def test_securities_stats_have_no_description(self):
        _, s = gen.synthetic(60)
        assert "pct_with_description" not in gen.stats(s)

    def test_avg_matches_close_to_paper_regime(self):
        """Paper Table 1: ~7.5 matches/entity (companies), ~5.4 (securities)."""
        c, s = gen.synthetic(400)
        assert 5.0 < gen.stats(c)["avg_matches_per_entity"] < 11.0
        assert 3.0 < gen.stats(s)["avg_matches_per_entity"] < 9.0

    def test_description_rate_near_32_pct(self):
        c, _ = gen.synthetic(400)
        assert 20.0 < gen.stats(c)["pct_with_description"] < 45.0


class TestWdcProducts:
    def test_row_count(self):
        pdf = wdc_products(500, seed=1)
        assert len(pdf) == 500

    def test_deterministic(self):
        assert wdc_products(200, seed=2).equals(wdc_products(200, seed=2))

    def test_group_sizes_heterogeneous(self):
        pdf = wdc_products(800, seed=3)
        sizes = pdf.groupby("gt_group").size()
        assert sizes.max() >= 8 and (sizes == 1).sum() > 0
        assert sizes.max() <= 20

    def test_one_offer_per_shop_within_group(self):
        pdf = wdc_products(500, seed=4)
        assert not pdf.duplicated(["gt_group", "source_id"]).any()

    def test_sibling_products_share_tokens(self):
        """Corner cases: hard negatives sharing most title tokens exist."""
        pdf = wdc_products(600, seed=5)
        brands_models = pdf["name"].str.lower().str.split().apply(
            lambda ws: frozenset(ws[:2]))
        by_key = pdf.assign(k=brands_models).groupby("k")["gt_group"].nunique()
        assert (by_key > 1).sum() > 5

    def test_columns(self):
        pdf = wdc_products(100, seed=6)
        assert list(pdf.columns) == [
            "record_id", "source_id", "gt_group", "name", "brand",
            "category", "price", "description", "acq_involved", "easy_group"]

    def test_record_ids_unique_and_sequential(self):
        pdf = wdc_products(300, seed=7)
        assert pdf["record_id"].tolist() == list(range(300))
