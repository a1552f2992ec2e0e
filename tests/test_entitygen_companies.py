"""Tests for company entity synthesis and record rendering."""
import numpy as np
import pytest

from repro.entitygen.artifacts import GenConfig, plan_artifacts
from repro.entitygen.companies import (CompanyEntity, compute_presence,
                                       make_entities, render_description,
                                       render_name, render_records)
from repro.entitygen import vocab


@pytest.fixture(scope="module")
def built():
    cfg = GenConfig(n_groups=200, seed=13)
    g = np.random.default_rng(cfg.seed)
    plan = plan_artifacts(cfg, g)
    ents = make_entities(cfg, plan, g)
    presence = compute_presence(ents, cfg, plan, g)
    records = render_records(ents, cfg, plan, presence, g)
    return cfg, plan, ents, presence, records


class TestMakeEntities:
    def test_count_includes_mergers(self, built):
        cfg, plan, ents, _, _ = built
        assert len(ents) == cfg.n_groups + len(plan.mergers)

    def test_entity_ids_sequential(self, built):
        _, _, ents, _, _ = built
        assert [e.entity_id for e in ents] == list(range(len(ents)))

    def test_names_mostly_distinct(self, built):
        _, _, ents, _, _ = built
        names = {" ".join(e.name_tokens) for e in ents}
        assert len(names) > 0.9 * len(ents)

    def test_locations_from_vocab(self, built):
        _, _, ents, _, _ = built
        assert all(e.loc in vocab.LOCATIONS for e in ents)

    def test_common_name_fraction(self):
        cfg = GenConfig(n_groups=400, common_name_prob=0.5, seed=1)
        g = np.random.default_rng(1)
        plan = plan_artifacts(cfg, g)
        ents = make_entities(cfg, plan, g)
        common = sum(
            1 for e in ents[:cfg.n_groups]
            if all(t in vocab.COMMON_TERMS for t in e.name_tokens)
        )
        assert 0.3 * cfg.n_groups < common < 0.7 * cfg.n_groups


class TestPresence:
    def test_every_entity_has_a_source(self, built):
        _, _, ents, presence, _ = built
        assert all(len(presence[e.entity_id].sources) >= 1 for e in ents)

    def test_sources_within_range(self, built):
        cfg, _, _, presence, _ = built
        for p in presence.values():
            assert all(0 <= s < cfg.n_sources for s in p.sources)

    def test_acquirees_have_bridge(self, built):
        _, plan, _, presence, _ = built
        for b in plan.acquirees:
            assert presence[b].bridge is not None
            assert presence[b].bridge in presence[b].sources

    def test_non_acquirees_no_bridge(self, built):
        _, plan, _, presence, _ = built
        for e, p in presence.items():
            if e not in plan.acquirees:
                assert p.bridge is None

    def test_merger_entities_sparser(self):
        cfg = GenConfig(n_groups=400, p_merger=0.2, seed=2)
        g = np.random.default_rng(2)
        plan = plan_artifacts(cfg, g)
        ents = make_entities(cfg, plan, g)
        presence = compute_presence(ents, cfg, plan, g)
        merged = [len(presence[c].sources) for c in plan.merger_entities]
        normal = [len(presence[e].sources) for e in range(cfg.n_groups)
                  if e not in set(plan.merger_entities)]
        assert np.mean(merged) < np.mean(normal)


class TestRenderName:
    def _ent(self, tokens=("Zorvex", "Energy", "Networks")):
        return CompanyEntity(0, tokens, vocab.LOCATIONS[0], "leading",
                             "fintech", "payment processing", "enterprises",
                             True)

    def test_acronym_artifact_on_source1(self):
        cfg = GenConfig()
        plan = plan_artifacts(GenConfig(n_groups=1, p_acronym=0), np.random.default_rng(0))
        plan.acronym.add(0)
        name = render_name(self._ent(), 1, plan, cfg, np.random.default_rng(0))
        assert name.split()[0] == "ZEN"

    def test_corp_term_always_appended(self):
        cfg = GenConfig()
        plan = plan_artifacts(GenConfig(n_groups=1), np.random.default_rng(0))
        plan.corp_term[0] = "Ltd"
        for seed in range(5):
            name = render_name(self._ent(), 0, plan, cfg,
                               np.random.default_rng(seed))
            assert "ltd" in name.lower()

    def test_contains_stem_most_of_the_time(self):
        cfg = GenConfig(p_typo=0.0)
        plan = plan_artifacts(GenConfig(n_groups=1, p_acronym=0,
                                        p_corp_term=0), np.random.default_rng(0))
        hits = sum(
            "zorvex" in render_name(self._ent(), 0, plan, cfg,
                                    np.random.default_rng(s)).lower()
            for s in range(30)
        )
        assert hits == 30  # the distinctive stem always survives (no typos)

    def test_deterministic_given_rng(self):
        cfg = GenConfig()
        plan = plan_artifacts(GenConfig(n_groups=1), np.random.default_rng(0))
        n1 = render_name(self._ent(), 0, plan, cfg, np.random.default_rng(5))
        n2 = render_name(self._ent(), 0, plan, cfg, np.random.default_rng(5))
        assert n1 == n2


class TestRenderDescription:
    def test_base_template_mentions_name_and_industry(self):
        ent = CompanyEntity(0, ("Zorvex", "Energy"), vocab.LOCATIONS[0],
                            "leading", "fintech", "payment processing",
                            "enterprises", True)
        d = render_description(ent, paraphrased=False)
        assert "Zorvex Energy" in d and "fintech" in d

    def test_paraphrase_changes_surface_form(self):
        ent = CompanyEntity(0, ("Zorvex", "Energy"), vocab.LOCATIONS[0],
                            "leading", "fintech", "payment processing",
                            "enterprises", True)
        base = render_description(ent, paraphrased=False)
        para = render_description(ent, paraphrased=True)
        assert base != para
        assert "fintech" in para  # facts preserved

    def test_paraphrase_applies_synonyms(self):
        ent = CompanyEntity(0, ("A",), vocab.LOCATIONS[0], "leading",
                            "fintech", "payment processing", "enterprises",
                            True)
        para = render_description(ent, paraphrased=True)
        assert "top" in para and "corporations" in para


class TestRenderRecords:
    def test_columns(self, built):
        _, _, _, _, records = built
        assert list(records.columns) == [
            "record_id", "source_id", "entity_id", "gt_group", "name",
            "city", "region", "country_code", "short_description",
            "acq_involved", "easy_group"]

    def test_record_ids_unique(self, built):
        _, _, _, _, records = built
        assert records["record_id"].is_unique

    def test_record_id_encodes_entity_and_source(self, built):
        _, _, _, _, records = built
        assert (records["record_id"] ==
                records["entity_id"] * 100 + records["source_id"]).all()

    def test_one_record_per_entity_source(self, built):
        _, _, _, _, records = built
        assert not records.duplicated(["entity_id", "source_id"]).any()

    def test_gt_group_matches_plan(self, built):
        _, plan, ents, _, records = built
        gt = plan.gt_company_group(len(ents))
        assert (records["gt_group"] == records["entity_id"].map(gt)).all()

    def test_acquiree_and_acquirer_share_gt_group(self, built):
        _, plan, _, _, records = built
        for a, b in plan.acquisitions:
            ga = set(records[records.entity_id == a]["gt_group"])
            gb = set(records[records.entity_id == b]["gt_group"])
            if ga and gb:
                assert ga == gb == {a}

    def test_acq_involved_flag(self, built):
        _, plan, _, _, records = built
        acq = set(plan.acquirees) | {a for a, _ in plan.acquisitions}
        assert (records["acq_involved"] ==
                records["entity_id"].isin(acq)).all()

    def test_easy_group_excludes_hard_artifacts(self, built):
        _, plan, _, _, records = built
        hard = (set(plan.acquirees) | {a for a, _ in plan.acquisitions}
                | set(plan.merger_entities) | plan.no_id_overlaps)
        assert (records["easy_group"] ==
                ~records["entity_id"].isin(hard)).all()

    def test_descriptions_nonempty_fraction(self, built):
        cfg, _, _, _, records = built
        frac = (records["short_description"] != "").mean()
        assert 0.1 < frac < 0.6
