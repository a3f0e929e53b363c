"""Unit tests for the noisy provider-snapshot generator (§2.2 substrate)."""
import pandas as pd
import pytest

from repro.kgdata.sources import SourceConfig, default_sources, source_snapshot

CFG = SourceConfig("testsrc", ("person", "city"), coverage=0.9, dup_prob=0.3)


class TestDeterminism:
    def test_same_tick_same_payload(self, uni):
        a = source_snapshot(uni, CFG, 2)
        b = source_snapshot(uni, CFG, 2)
        pd.testing.assert_frame_equal(a.entities, b.entities)
        pd.testing.assert_frame_equal(a.rels, b.rels)

    def test_volatile_changes_every_tick(self, uni):
        a = source_snapshot(uni, CFG, 1).popularity.set_index("id").popularity
        b = source_snapshot(uni, CFG, 2).popularity.set_index("id").popularity
        common = a.index.intersection(b.index)
        assert len(common) > 5
        assert (a[common] != b[common]).mean() > 0.9

    def test_stable_payload_mostly_stable_across_ticks(self, uni):
        a = source_snapshot(uni, CFG, 1)
        b = source_snapshot(uni, CFG, 2)
        ja = a.entities.set_index("id")
        jb = b.entities.set_index("id")
        common = ja.index.intersection(jb.index)
        same = (ja.loc[common].fillna("") == jb.loc[common].fillna("")).all(axis=1)
        assert same.mean() > 0.5  # updates exist but are the minority


class TestCoverageAndTimeline:
    def test_only_covered_types(self, uni):
        snap = source_snapshot(uni, CFG, 0)
        assert set(snap.entities["type"].dropna()) <= {"person", "city"}

    def test_not_onboarded_source_is_empty(self, uni):
        late = SourceConfig("late", ("person",), onboard_tick=5)
        snap = source_snapshot(uni, late, 2)
        assert snap.entities.empty

    def test_onboarded_source_publishes(self, uni):
        late = SourceConfig("late", ("person",), onboard_tick=5)
        assert len(source_snapshot(uni, late, 5).entities) > 0

    def test_births_appear_over_time(self, uni):
        n0 = len(source_snapshot(uni, CFG, 0).entities)
        n9 = len(source_snapshot(uni, CFG, 9).entities)
        assert n9 > n0

    def test_deletions_occur(self, uni):
        ids0 = set(source_snapshot(uni, CFG, 0).entities.id)
        ids9 = set(source_snapshot(uni, CFG, 9).entities.id)
        assert ids0 - ids9  # someone was deleted along the way


class TestNoise:
    def test_duplicate_records_present(self, uni):
        snap = source_snapshot(uni, CFG, 0)
        dups = [i for i in snap.entities.id if ":d" in i]
        assert dups

    def test_truth_maps_every_record(self, uni):
        snap = source_snapshot(uni, CFG, 0)
        assert set(snap.entities.id) == set(snap.truth.id)

    def test_duplicates_share_truth(self, uni):
        snap = source_snapshot(uni, CFG, 0)
        t = dict(zip(snap.truth.id, snap.truth.eid))
        for i in snap.entities.id:
            if ":d" in i:
                assert t[i] == t[i.replace(":d", ":")]


class TestColumnVocabulary:
    def test_column_map_renames(self, uni):
        cfg = SourceConfig("m", ("song",), column_map={"name": "track_name"})
        snap = source_snapshot(uni, cfg, 0)
        assert "track_name" in snap.entities.columns
        assert "name" not in snap.entities.columns

    def test_split_full_title(self, uni):
        cfg = SourceConfig("mv", ("movie",), split_full_title=True)
        snap = source_snapshot(uni, cfg, 0)
        assert {"title", "subtitle"} <= set(snap.entities.columns)
        assert "full_title" not in snap.entities.columns

    def test_default_fleet_onboarding_schedule(self):
        fleet = default_sources(saga_tick=4, n_legacy=3)
        ticks = [c.onboard_tick for c in fleet]
        assert ticks[:3] == [0, 0, 0]
        assert ticks[3:] == [4, 5, 6, 7, 8]

    @pytest.mark.parametrize("cfg", default_sources(), ids=lambda c: c.name)
    def test_fleet_types_valid(self, cfg):
        from repro.core import schema as S

        assert set(cfg.types) <= set(S.ONTOLOGY)
