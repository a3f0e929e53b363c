"""Unit tests for the ground-truth universe generator."""
import pandas as pd
import pytest

from repro.core import schema as S
from repro.kgdata.universe import NICKNAMES, Universe, make_universe


class TestDeterminism:
    def test_same_seed_same_world(self):
        a = make_universe(n_entities=150, seed=3)
        b = make_universe(n_entities=150, seed=3)
        pd.testing.assert_frame_equal(a.entities, b.entities)
        pd.testing.assert_frame_equal(a.attrs, b.attrs)
        pd.testing.assert_frame_equal(a.rels, b.rels)

    def test_different_seed_different_world(self):
        a = make_universe(n_entities=150, seed=3)
        b = make_universe(n_entities=150, seed=4)
        assert not a.entities.name.equals(b.entities.name)


class TestStructure:
    def test_size(self, uni: Universe):
        assert len(uni.entities) == 300
        assert uni.entities.eid.is_unique

    def test_types_from_mix(self, uni):
        assert set(uni.entities.type) <= set(S.ONTOLOGY)

    def test_every_entity_has_attrs_of_its_type(self, uni):
        merged = uni.attrs.merge(uni.entities[["eid", "type"]], on="eid")
        for pred, etype in zip(merged.predicate, merged.type):
            assert pred in S.all_predicates(etype), (pred, etype)

    def test_composite_rels_follow_ontology(self, uni):
        merged = uni.rels.merge(uni.entities[["eid", "type"]], on="eid")
        for pred, rp, etype in zip(merged.predicate, merged.r_predicate, merged.type):
            assert rp in S.COMPOSITE_RELS[etype][pred]

    def test_popularity_is_zipfian(self, uni):
        pops = sorted(uni.entities.popularity, reverse=True)
        assert pops[0] == pytest.approx(1.0)
        assert pops[len(pops) // 2] < 0.1

    def test_birth_ticks_bounded(self, uni):
        assert uni.entities.birth_tick.min() == 0
        assert uni.entities.birth_tick.max() < 12
        # majority of the world exists at tick 0
        assert (uni.entities.birth_tick == 0).mean() > 0.4

    def test_ref_attrs_point_to_existing_entities(self, uni):
        refs = uni.attrs[uni.attrs.obj_eid.notna()]
        assert set(refs.obj_eid.astype(int)) <= set(uni.entities.eid)


class TestAliases:
    def test_canonical_name_is_an_alias(self, uni):
        for eid in uni.entities.eid[:50]:
            assert uni.name_of(int(eid)) in uni.aliases_of(int(eid))

    def test_person_nicknames_present(self, uni):
        persons = uni.entities[uni.entities.type.isin(S.PERSON_TYPES)]
        with_nick = 0
        for eid, name in zip(persons.eid, persons.name):
            first = name.split()[0]
            if first in NICKNAMES:
                aliases = uni.aliases_of(int(eid))
                nick = f"{NICKNAMES[first]} {name.split(' ', 1)[1]}"
                assert nick in aliases
                with_nick += 1
        assert with_nick > 10


class TestAmbiguity:
    def test_families_share_names(self, uni):
        assert uni.ambiguous_families
        for fam in uni.ambiguous_families:
            names = {uni.name_of(e) for e in fam}
            assert len(names) == 1

    def test_family_head_is_most_popular(self, uni):
        for fam in uni.ambiguous_families:
            head, *tails = fam
            for t in tails:
                assert uni.popularity_of(head) >= uni.popularity_of(t)

    def test_cross_type_collisions_exist(self, uni):
        cross = [
            f for f in uni.ambiguous_families
            if len({uni.type_of(e) for e in f}) > 1
        ]
        assert cross


class TestNeighbors:
    def test_neighbors_symmetric(self, uni):
        for eid in uni.entities.eid[:80]:
            for n in uni.neighbors_of(int(eid)):
                assert int(eid) in uni.neighbors_of(n)

    def test_neighbors_exist(self, uni):
        n_with = sum(1 for e in uni.entities.eid if uni.neighbors_of(int(e)))
        assert n_with > len(uni.entities) * 0.4
