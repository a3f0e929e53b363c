"""Unit tests for the ontology + extended-triples data model (§2.1)."""
import pytest

from repro.core import schema as S


class TestOntology:
    @pytest.mark.parametrize("etype", sorted(S.ONTOLOGY))
    def test_every_type_has_predicates(self, etype):
        assert S.all_predicates(etype), etype

    @pytest.mark.parametrize("etype", sorted(S.ONTOLOGY))
    def test_literal_and_ref_partition_the_predicates(self, etype):
        lits, refs = S.literal_predicates(etype), S.ref_predicates(etype)
        assert set(lits) | set(refs) == set(S.all_predicates(etype))
        assert not set(lits) & set(refs)

    @pytest.mark.parametrize("etype", sorted(S.ONTOLOGY))
    def test_ref_predicates_have_target_types(self, etype):
        for p in S.ref_predicates(etype):
            assert p in S.REF_TARGET_TYPE, f"{etype}.{p} lacks a target type"
            assert S.REF_TARGET_TYPE[p] in S.ONTOLOGY

    @pytest.mark.parametrize("etype", sorted(S.COMPOSITE_RELS))
    def test_composite_types_exist_in_ontology(self, etype):
        assert etype in S.ONTOLOGY

    @pytest.mark.parametrize(
        "etype,pred",
        [(t, p) for t, d in S.COMPOSITE_RELS.items() for p in d],
    )
    def test_composite_predicates_disjoint_from_simple(self, etype, pred):
        assert pred not in S.all_predicates(etype)

    def test_school_r_predicate_is_resolvable(self):
        assert S.REF_TARGET_TYPE["school"] == "org"

    @pytest.mark.parametrize("pred", sorted(S.FUNCTIONAL_PREDS))
    def test_functional_preds_are_literal_somewhere(self, pred):
        assert any(pred in S.literal_predicates(t) for t in S.ONTOLOGY)

    def test_volatile_not_functional(self):
        assert not S.VOLATILE_PREDS & S.FUNCTIONAL_PREDS


class TestIds:
    @pytest.mark.parametrize("src", ["wiki:1", "musicdb:d42", "a:b:c"])
    def test_kg_id_roundtrip(self, src):
        kid = S.kg_id(src)
        assert S.is_kg_id(kid)
        assert kid == f"kg:{src}"

    @pytest.mark.parametrize("s", ["wiki:1", "", "KG:x", "k g:1"])
    def test_source_namespace_is_not_kg(self, s):
        assert not S.is_kg_id(s)

    def test_kg_id_deterministic(self):
        assert S.kg_id("src:9") == S.kg_id("src:9")


class TestSchemas:
    def test_fact_key_fields_exist_in_both_schemas(self):
        for f in S.FACT_KEY:
            assert f in S.SOURCE_TRIPLE_SCHEMA.fieldNames()
            assert f in S.KG_TRIPLE_SCHEMA.fieldNames()

    def test_source_schema_has_scalar_provenance(self):
        assert S.SOURCE_TRIPLE_SCHEMA["source"].dataType.typeName() == "string"
        assert S.SOURCE_TRIPLE_SCHEMA["trust"].dataType.typeName() == "double"

    def test_kg_schema_has_array_provenance(self):
        assert S.KG_TRIPLE_SCHEMA["sources"].dataType.typeName() == "array"
        assert S.KG_TRIPLE_SCHEMA["trust"].dataType.typeName() == "array"
        assert "confidence" in S.KG_TRIPLE_SCHEMA.fieldNames()
