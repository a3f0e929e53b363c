"""Unit tests for the NERD stack (§5.2)."""
import pytest

from repro.ml.nerd import (
    BASELINE_CONFIG,
    NERD_CONFIG,
    EntityRecord,
    NERDIndex,
    view_from_universe,
)

RECORDS = [
    EntityRecord("h", ["Hanover"], ["city"], neighbor_names=["Brandenburg Gate"],
                 neighbor_types=["org"], importance=0.9),
    EntityRecord("h_nh", ["Hanover"], ["city"], neighbor_names=["Dartmouth College"],
                 neighbor_types=["org"], importance=0.05),
    EntityRecord("movie", ["Hanover"], ["movie"], neighbor_names=["Jane Doe"],
                 importance=0.2),
    EntityRecord("tom", ["Tom Hanks", "Thomas Hanks"], ["person"],
                 neighbor_names=["Rita Wilson"], importance=0.7),
]


@pytest.fixture(scope="module")
def idx():
    return NERDIndex(RECORDS)


class TestCandidates:
    def test_exact_name_retrieval(self, idx):
        assert set(idx.candidates("Hanover")) == {"h", "h_nh", "movie"}

    def test_alias_retrieval(self, idx):
        assert "tom" in idx.candidates("Thomas Hanks")

    def test_typo_retrieval_via_grams(self, idx):
        assert "tom" in idx.candidates("Tom Hnaks")

    def test_type_hint_filters(self, idx):
        assert set(idx.candidates("Hanover", type_hint="movie")) == {"movie"}

    def test_nonsense_has_no_candidates(self, idx):
        assert idx.candidates("zzqqy") == []


class TestDisambiguation:
    def test_context_picks_tail_entity(self, idx):
        p = idx.disambiguate("Hanover", "we visited Dartmouth College downtown")
        assert p.entity_id == "h_nh"

    def test_no_context_baseline_prefers_head(self, idx):
        p = idx.disambiguate("Hanover", "", config=BASELINE_CONFIG)
        assert p.entity_id == "h"

    def test_type_hint_overrides_popularity(self, idx):
        p = idx.disambiguate("Hanover", "", type_hint="movie")
        assert p.entity_id == "movie"

    def test_rejection_on_nonsense(self, idx):
        p = idx.disambiguate("zzqqy", "")
        assert p.entity_id is None

    def test_confidence_in_unit_interval(self, idx):
        for m in ["Hanover", "Tom Hanks", "zzqqy"]:
            p = idx.disambiguate(m, "")
            assert 0.0 <= p.confidence <= 1.0

    def test_unambiguous_entity_high_confidence(self, idx):
        p = idx.disambiguate("Tom Hanks", "Rita Wilson film")
        assert p.entity_id == "tom" and p.confidence > 0.9

    def test_baseline_less_confident_on_ambiguous_names(self, idx):
        ambiguous = idx.disambiguate("Hanover", "", config=BASELINE_CONFIG)
        clear = idx.disambiguate("Tom Hanks", "", config=BASELINE_CONFIG)
        assert clear.confidence > ambiguous.confidence


class TestViewFromUniverse:
    def test_one_record_per_entity(self, uni):
        recs = view_from_universe(uni)
        assert len(recs) == len(uni.entities)

    def test_importance_normalized(self, uni):
        recs = view_from_universe(uni)
        imps = [r.importance for r in recs]
        assert max(imps) == pytest.approx(1.0)
        assert min(imps) >= 0.0

    def test_neighbors_are_names(self, uni):
        recs = {r.entity_id: r for r in view_from_universe(uni)}
        eid = next(e for e in uni.entities.eid if uni.neighbors_of(int(e)))
        rec = recs[str(int(eid))]
        expected = {uni.name_of(n) for n in uni.neighbors_of(int(eid))}
        assert set(rec.neighbor_names) == expected

    def test_evidence_tokens_lowercased(self):
        r = EntityRecord("x", ["X"], ["t"], neighbor_names=["Foo Bar"], description="Baz")
        assert {"foo", "bar", "baz"} <= r.evidence_tokens()
