"""Unit tests for the live serving substrates (§4.1)."""
import pytest

from repro.live.index import InvertedIndex, KVStore


class TestKVStore:
    @pytest.mark.parametrize("n_shards", [1, 2, 4, 8])
    def test_put_get_across_shards(self, n_shards):
        kv = KVStore(n_shards)
        for i in range(50):
            kv.put(f"e{i}", {"v": i})
        assert len(kv) == 50
        for i in range(50):
            assert kv.get(f"e{i}") == {"v": i}

    def test_get_missing_is_none(self):
        assert KVStore().get("nope") is None

    def test_overwrite(self):
        kv = KVStore()
        kv.put("a", {"v": 1})
        kv.put("a", {"v": 2})
        assert kv.get("a") == {"v": 2}
        assert len(kv) == 1

    def test_delete(self):
        kv = KVStore()
        kv.put("a", {})
        kv.delete("a")
        kv.delete("a")  # idempotent
        assert kv.get("a") is None

    def test_shard_sizes_sum(self):
        kv = KVStore(4)
        for i in range(97):
            kv.put(f"k{i}", {})
        assert sum(kv.shard_sizes()) == 97


class TestInvertedIndex:
    def test_all_token_semantics(self):
        ix = InvertedIndex()
        ix.add("Tom Hanks", "e1")
        ix.add("Tom Petty", "e2")
        assert ix.lookup("tom hanks") == {"e1"}
        assert ix.lookup("tom") == {"e1", "e2"}
        assert ix.lookup("hanks petty") == set()

    def test_any_token_semantics(self):
        ix = InvertedIndex()
        ix.add("Tom Hanks", "e1")
        ix.add("Tom Petty", "e2")
        assert ix.lookup_any("hanks petty") == {"e1", "e2"}

    def test_case_insensitive(self):
        ix = InvertedIndex()
        ix.add("HANOVER", "e1")
        assert ix.lookup("hanover") == {"e1"}

    def test_remove(self):
        ix = InvertedIndex()
        ix.add("Rome", "e1")
        ix.add("Rome", "e2")
        ix.remove("Rome", "e1")
        assert ix.lookup("rome") == {"e2"}

    def test_empty_query(self):
        assert InvertedIndex().lookup("") == set()

    @pytest.mark.parametrize("n_shards", [1, 3, 7])
    def test_sharding_transparent(self, n_shards):
        ix = InvertedIndex(n_shards)
        for i in range(40):
            ix.add(f"name{i} common", f"e{i}")
        assert len(ix.lookup("common")) == 40
        assert ix.lookup("name7") == {"e7"}
