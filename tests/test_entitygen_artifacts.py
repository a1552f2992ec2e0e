"""Tests for artifact planning (GenConfig + ArtifactPlan)."""
import numpy as np
import pytest

from repro.entitygen.artifacts import GenConfig, plan_artifacts


def _plan(seed=0, **kw):
    cfg = GenConfig(n_groups=500, seed=seed, **kw)
    return cfg, plan_artifacts(cfg, np.random.default_rng(seed))


class TestPlanArtifacts:
    def test_deterministic(self):
        _, p1 = _plan(seed=9)
        _, p2 = _plan(seed=9)
        assert p1.acquisitions == p2.acquisitions
        assert p1.mergers == p2.mergers
        assert p1.acronym == p2.acronym
        assert p1.corp_term == p2.corp_term

    def test_seed_changes_plan(self):
        _, p1 = _plan(seed=1)
        _, p2 = _plan(seed=2)
        assert (p1.acronym != p2.acronym or p1.acquisitions != p2.acquisitions)

    def test_cross_event_participants_disjoint(self):
        _, p = _plan()
        seen = set()
        for a, b in p.acquisitions:
            assert a not in seen and b not in seen and a != b
            seen |= {a, b}
        for a, b, _ in p.mergers:
            assert a not in seen and b not in seen and a != b
            seen |= {a, b}

    def test_merger_entity_ids_follow_base(self):
        cfg, p = _plan()
        expected = cfg.n_groups
        for _, _, c in p.mergers:
            assert c == expected
            expected += 1

    @pytest.mark.parametrize("rate,attr", [
        ("p_acronym", "acronym"), ("p_paraphrase", "paraphrase"),
        ("p_multiple_ids", "multiple_ids"),
        ("p_no_id_overlaps", "no_id_overlaps"),
        ("p_multiple_securities", "multiple_securities"),
    ])
    def test_artifact_rates_approximate(self, rate, attr):
        cfg, p = _plan()
        n = len(getattr(p, attr))
        expected = getattr(cfg, rate) * cfg.n_groups
        assert expected * 0.5 - 5 <= n <= expected * 1.8 + 5

    def test_acquisition_rate(self):
        cfg, p = _plan()
        assert len(p.acquisitions) == int(cfg.n_groups * cfg.p_acquisition)

    def test_merger_rate(self):
        cfg, p = _plan()
        assert len(p.mergers) == int(cfg.n_groups * cfg.p_merger) // 2

    def test_corp_term_values_valid(self):
        from repro.entitygen.vocab import CORPORATE_SUFFIXES
        _, p = _plan()
        assert p.corp_term  # nonempty at 30% of 500 groups
        for term in p.corp_term.values():
            assert term in CORPORATE_SUFFIXES

    def test_zero_rates_yield_empty_plan(self):
        cfg = GenConfig(n_groups=100, p_acronym=0, p_corp_term=0,
                        p_paraphrase=0, p_acquisition=0, p_merger=0,
                        p_multiple_ids=0, p_no_id_overlaps=0,
                        p_multiple_securities=0)
        p = plan_artifacts(cfg, np.random.default_rng(0))
        assert not (p.acronym or p.corp_term or p.paraphrase
                    or p.acquisitions or p.mergers or p.multiple_ids
                    or p.no_id_overlaps or p.multiple_securities)


class TestGroundTruthMapping:
    def test_acquirees_fold_into_acquirers(self):
        cfg, p = _plan()
        gt = p.gt_company_group(cfg.n_groups + len(p.mergers))
        for a, b in p.acquisitions:
            assert gt[b] == a
            assert gt[a] == a

    def test_mergers_do_not_merge_ground_truth(self):
        cfg, p = _plan()
        gt = p.gt_company_group(cfg.n_groups + len(p.mergers))
        for a, b, c in p.mergers:
            assert len({gt[a], gt[b], gt[c]}) == 3

    def test_uninvolved_entities_map_to_self(self):
        cfg, p = _plan()
        gt = p.gt_company_group(cfg.n_groups)
        involved = set(p.acquirees)
        for e in range(cfg.n_groups):
            if e not in involved:
                assert gt[e] == e

    def test_acquirees_property(self):
        _, p = _plan()
        assert p.acquirees == {b: a for a, b in p.acquisitions}
