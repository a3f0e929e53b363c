"""Unit tests for the KGQ query language and Live Query Engine (§4.2)."""
import pytest

from repro.live.construction import LiveGraph, stable_records_from_universe
from repro.live.kgq import KGQSyntaxError, LiveQueryEngine, parse


@pytest.fixture(scope="module")
def engine(uni):
    g = LiveGraph()
    g.load_stable(stable_records_from_universe(uni))
    return LiveQueryEngine(g)


class TestParser:
    @pytest.mark.parametrize(
        "text,find,etype,follow,returns,limit",
        [
            ('FIND "tom"', "tom", None, (), ("name",), 10),
            ('FIND "tom" TYPE person', "tom", "person", (), ("name",), 10),
            ('FIND "a b" FOLLOW spouse', "a b", None, ("spouse",), ("name",), 10),
            ('FIND "x" FOLLOW spouse.birthplace', "x", None,
             ("spouse", "birthplace"), ("name",), 10),
            ('FIND "x" RETURN name,birthdate', "x", None, (), ("name", "birthdate"), 10),
            ('FIND "x" LIMIT 3', "x", None, (), ("name",), 3),
            ('find "x" type city limit 2', "x", "city", (), ("name",), 2),
        ],
    )
    def test_valid(self, text, find, etype, follow, returns, limit):
        q = parse(text)
        assert (q.find, q.etype, q.follow, q.returns, q.limit) == (
            find, etype, follow, returns, limit,
        )

    @pytest.mark.parametrize(
        "bad",
        [
            "", "FIND tom", 'MATCH "tom"', 'FIND "tom" FOLLOW', 'FIND "x" LIMIT x',
            'FIND "x" EXPLODE y',
        ],
    )
    def test_invalid_raises(self, bad):
        with pytest.raises(KGQSyntaxError):
            parse(bad)


class TestExecution:
    def test_point_lookup(self, engine, uni):
        eid = int(uni.entities.eid.iloc[0])
        res = engine.execute(f'FIND "{uni.name_of(eid)}" RETURN name')
        assert str(eid) in [r.entity_id for r in res]

    def test_type_pushdown_filters(self, engine, uni):
        fam = next(
            (f for f in uni.ambiguous_families
             if len({uni.type_of(e) for e in f}) > 1),
            None,
        )
        assert fam is not None
        name = uni.name_of(fam[0])
        t0 = uni.type_of(fam[0])
        res = engine.execute(f'FIND "{name}" TYPE {t0} LIMIT 10')
        types = {t for r in res for t in engine.graph.get(r.entity_id)["types"]}
        assert types == {t0}

    def test_one_hop_traversal(self, engine, uni):
        row = uni.attrs[(uni.attrs.predicate == "spouse") & uni.attrs.obj_eid.notna()].iloc[0]
        name = uni.name_of(int(row.eid))
        res = engine.execute(f'FIND "{name}" TYPE person FOLLOW spouse RETURN name')
        assert str(int(row.obj_eid)) in [r.entity_id for r in res]

    def test_two_hop_traversal(self, engine, uni):
        spouses = uni.attrs[(uni.attrs.predicate == "spouse") & uni.attrs.obj_eid.notna()]
        bp = uni.attrs[(uni.attrs.predicate == "birthplace") & uni.attrs.obj_eid.notna()]
        with_bp = set(bp.eid)
        row = next((r for r in spouses.itertuples() if int(r.obj_eid) in with_bp), None)
        if row is None:
            pytest.skip("no spouse-with-birthplace chain in small world")
        res = engine.execute(
            f'FIND "{uni.name_of(int(row.eid))}" TYPE person '
            f"FOLLOW spouse.birthplace RETURN name,country"
        )
        expected = int(bp[bp.eid == int(row.obj_eid)].obj_eid.iloc[0])
        assert str(expected) in [r.entity_id for r in res]

    def test_limit_respected(self, engine):
        res = engine.execute('FIND "the" LIMIT 2')
        assert len(res) <= 2

    def test_returns_projected(self, engine, uni):
        persons = uni.entities[uni.entities.type == "person"]
        name = persons.name.iloc[0]
        res = engine.execute(f'FIND "{name}" TYPE person RETURN name,birthdate')
        assert res and set(res[0].values) == {"name", "birthdate"}


class TestVirtualOperators:
    def test_register_and_execute(self, engine, uni):
        engine.register_operator(
            "wherePlays",
            lambda nm: f'FIND "{nm}" TYPE team FOLLOW home_city RETURN name',
        )
        row = uni.attrs[(uni.attrs.predicate == "home_city") & uni.attrs.obj_eid.notna()]
        team_eid = int(row.eid.iloc[0])
        res = engine.execute(f'OP wherePlays("{uni.name_of(team_eid)}")')
        assert str(int(row.obj_eid.iloc[0])) in [r.entity_id for r in res]

    def test_unknown_operator_raises(self, engine):
        with pytest.raises(KGQSyntaxError):
            engine.execute('OP summonDragons("x")')


class TestCache:
    def test_repeat_query_served_from_cache(self, engine, uni):
        q = f'FIND "{uni.entities.name.iloc[1]}" RETURN name'
        first = engine.execute(q)
        assert engine.execute(q) is first
