"""Live Graph construction (§4.1) and curation (§4.3).

The live KG is the union of a *view of the stable graph* with real-time
streaming sources (sports scores, stock prices, flights).  Live entities
are uniquely identifiable across sources (no linking/fusion needed), but
their *references* to stable entities (teams, venues, cities) are text
mentions — resolved against the stable graph with the NERD-based Entity
Resolution service (§5.2).  Curations arrive as just another streaming
source and *hot fix* the indexes directly.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.live.index import InvertedIndex, KVStore
from repro.ml.nerd import NERDIndex, NERD_CONFIG


@dataclass
class LiveEvent:
    """One streaming update.

    ``kind='live_fact'``: upsert ``predicate=value`` on a (possibly new)
    live entity; ``refs`` maps reference predicates to *text mentions* of
    stable entities, resolved at ingest.
    ``kind='curation'``: human curation — ``action='block'`` quarantines a
    fact, ``action='edit'`` replaces its value (§4.3).
    """

    kind: str
    entity_id: str
    predicate: str = ""
    value: object = None
    name: str | None = None
    etype: str | None = None
    refs: dict[str, str] = field(default_factory=dict)
    action: str = ""


class LiveGraph:
    """Stable-graph view ∪ streaming sources, served from low-latency
    indexes (inverted index + KV store)."""

    def __init__(self, *, resolver: NERDIndex | None = None, n_shards: int = 4):
        self.kv = KVStore(n_shards)
        self.index = InvertedIndex(n_shards)
        self.resolver = resolver
        self.curation_log: list[LiveEvent] = []

    # -- stable side -------------------------------------------------------
    def load_stable(self, records: list[dict]) -> None:
        """Ingest a stable-KG view: one record per entity with ``id``,
        ``names``, ``types``, ``facts`` (pred → list of values) and
        ``neighbors`` (pred → list of entity ids)."""
        for r in records:
            doc = {
                "id": r["id"],
                "names": list(r.get("names", [])),
                "types": list(r.get("types", [])),
                "facts": {k: list(v) for k, v in r.get("facts", {}).items()},
                "neighbors": {k: list(v) for k, v in r.get("neighbors", {}).items()},
                "live": {},
                "blocked": set(),
            }
            self.kv.put(r["id"], doc)
            for nm in doc["names"]:
                self.index.add(nm, r["id"])

    # -- streaming side ------------------------------------------------------
    def apply(self, ev: LiveEvent) -> None:
        """Apply one streaming event; all effects are immediately visible."""
        if ev.kind == "curation":
            self._apply_curation(ev)
            return
        if ev.kind != "live_fact":
            raise ValueError(f"unknown event kind {ev.kind!r}")
        doc = self.kv.get(ev.entity_id)
        if doc is None:
            doc = {
                "id": ev.entity_id,
                "names": [ev.name] if ev.name else [],
                "types": [ev.etype] if ev.etype else [],
                "facts": {},
                "neighbors": {},
                "live": {},
                "blocked": set(),
            }
            self.kv.put(ev.entity_id, doc)
            for nm in doc["names"]:
                self.index.add(nm, ev.entity_id)
        if ev.predicate:
            doc["live"][ev.predicate] = ev.value
        # resolve text references to stable entities (§4.1)
        for pred, mention in ev.refs.items():
            target = self.resolve_reference(mention)
            if target is not None:
                doc["neighbors"].setdefault(pred, [])
                if target not in doc["neighbors"][pred]:
                    doc["neighbors"][pred].append(target)

    def resolve_reference(self, mention: str, *, type_hint: str | None = None) -> str | None:
        """Entity Resolution service: mention text → stable entity id."""
        if self.resolver is None:
            ids = sorted(self.index.lookup(mention))
            return ids[0] if ids else None
        pred = self.resolver.disambiguate(mention, type_hint=type_hint, config=NERD_CONFIG)
        return pred.entity_id if pred.confidence >= 0.5 else None

    def _apply_curation(self, ev: LiveEvent) -> None:
        """Hot fix the live indexes; the event is also recorded so stable
        construction can consume curations as a source next tick (§4.3)."""
        if ev.action not in ("block", "edit"):
            raise ValueError(f"unknown curation action {ev.action!r}")
        self.curation_log.append(ev)
        doc = self.kv.get(ev.entity_id)
        if doc is None:
            return
        if ev.action == "block":
            doc["blocked"].add(ev.predicate)
        else:
            doc["facts"][ev.predicate] = [ev.value]
            doc["blocked"].discard(ev.predicate)

    # -- read surface used by the query engine -----------------------------
    def get(self, entity_id: str) -> dict | None:
        return self.kv.get(entity_id)

    def facts_of(self, entity_id: str, predicate: str) -> list:
        """Serving-time fact lookup: live values shadow stable ones and
        blocked facts are suppressed."""
        doc = self.kv.get(entity_id)
        if doc is None or predicate in doc["blocked"]:
            return []
        if predicate in doc["live"]:
            return [doc["live"][predicate]]
        return list(doc["facts"].get(predicate, []))

    def neighbors_of(self, entity_id: str, predicate: str) -> list[str]:
        doc = self.kv.get(entity_id)
        if doc is None or predicate in doc["blocked"]:
            return []
        return list(doc["neighbors"].get(predicate, []))

    def find(self, text: str) -> list[str]:
        """All-token index lookup, falling back to any-token."""
        ids = self.index.lookup(text) or self.index.lookup_any(text)
        return sorted(ids)


def stable_records_from_universe(uni) -> list[dict]:
    """Build the stable-graph view records from the ground-truth universe
    (experiment harness path; production uses an engine view)."""
    recs = []
    for eid, etype in zip(uni.entities.eid, uni.entities.type):
        eid = int(eid)
        attrs = uni.attrs[uni.attrs.eid == eid]
        facts: dict[str, list] = {}
        neighbors: dict[str, list[str]] = {}
        for pred, obj, obj_eid in zip(attrs.predicate, attrs.obj, attrs.obj_eid):
            facts.setdefault(pred, []).append(obj)
            if obj_eid == obj_eid and obj_eid is not None:  # not NaN
                neighbors.setdefault(pred, []).append(str(int(obj_eid)))
        recs.append(
            {
                "id": str(eid),
                "names": uni.aliases_of(eid),
                "types": [etype],
                "facts": facts,
                "neighbors": neighbors,
            }
        )
    return recs
