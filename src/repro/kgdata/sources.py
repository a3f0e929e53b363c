"""Noisy per-provider snapshots of the universe over a timeline.

Each provider (``SourceConfig``) covers a subset of entity types, publishes
entity payloads in its *own* namespace and column vocabulary (so ontology
alignment has real work to do), and corrupts the ground truth with typos,
nickname aliases, duplicate records, value errors and missing predicates.
Snapshots are a pure, deterministic function of ``(universe, cfg, tick)``:
re-rendering tick *t* always yields byte-identical payloads, which is what
makes delta computation (§2.2/§2.4) meaningful.

Timeline semantics per entity:

* included iff a per-(source, entity) coin < ``coverage``, the entity's
  ``birth_tick`` ≤ tick, the source has onboarded, and tick < its
  per-source ``delete_tick`` (if any);
* each (entity, predicate) may carry a one-time *update* at a drawn tick —
  after that tick the source reports a revised value;
* the ``popularity`` predicate is volatile: it changes every tick and is
  published as a separate full-dump artifact (§2.4).
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core import schema as S
from repro.kgdata.universe import Universe

_UPDATABLE = {"birthdate", "genre", "occupation", "record_label", "country"}


def _h(s: str) -> int:
    """Stable 32-bit hash (Python's ``hash`` is salted per process)."""
    return zlib.crc32(s.encode())


def _typo(g: np.random.Generator, s: str) -> str:
    """Introduce one deterministic typo: drop or swap adjacent characters."""
    if len(s) < 4:
        return s
    i = int(g.integers(1, len(s) - 1))
    if g.random() < 0.5:
        return s[:i] + s[i + 1 :]
    return s[: i - 1] + s[i] + s[i - 1] + s[i + 1 :]


@dataclass(frozen=True)
class SourceConfig:
    """One upstream data provider.

    ``column_map`` maps KG-ontology predicates to this source's column
    names (the inverse mapping is the PGF configuration, §2.2).  When
    ``split_full_title`` is set the source publishes ``full_title`` as two
    columns (``title``, ``subtitle``) and the PGF must combine them — the
    paper's ``<title, sequel_number> → full_title`` example.
    """

    name: str
    types: tuple[str, ...]
    coverage: float = 0.7
    trust: float = 0.8
    typo_prob: float = 0.08
    alias_prob: float = 0.15
    dup_prob: float = 0.05
    error_prob: float = 0.04
    missing_prob: float = 0.05
    update_prob: float = 0.25
    delete_prob: float = 0.05
    onboard_tick: int = 0
    column_map: dict[str, str] = field(default_factory=dict, hash=False)
    split_full_title: bool = False

    def col(self, predicate: str) -> str:
        return self.column_map.get(predicate, predicate)


@dataclass
class SourceSnapshot:
    """Raw artifacts a provider publishes at one tick.

    ``entities``   wide frame, one row per *record* (duplicates included),
                   columns named in the source vocabulary, plus ``id``.
    ``rels``       long frame of composite relationships
                   (id, predicate, r_idx, r_predicate, obj).
    ``popularity`` volatile full dump (id, popularity).
    ``truth``      ground-truth map (id → true universe eid) — for
                   evaluation only, never consumed by the pipeline.
    """

    source: str
    tick: int
    entities: pd.DataFrame
    rels: pd.DataFrame
    popularity: pd.DataFrame
    truth: pd.DataFrame


def _entity_rng(seed: int, src: str, eid: int) -> np.random.Generator:
    return np.random.default_rng([seed, _h(src), eid])


def source_snapshot(
    uni: Universe, cfg: SourceConfig, tick: int, *, seed: int = 0, n_ticks: int = 12
) -> SourceSnapshot:
    """Render provider ``cfg``'s payload at ``tick`` (deterministic)."""
    ent_rows: list[dict] = []
    rel_rows: list[tuple] = []
    pop_rows: list[tuple] = []
    truth_rows: list[tuple] = []

    if tick < cfg.onboard_tick:
        empty = pd.DataFrame()
        return SourceSnapshot(cfg.name, tick, empty, empty, empty, empty)

    sub = uni.entities[uni.entities.type.isin(cfg.types)]
    attrs_by_eid = dict(iter(uni.attrs.groupby("eid")))
    rels_by_eid = dict(iter(uni.rels.groupby("eid")))

    for eid, etype, name, birth, pop in zip(
        sub.eid, sub.type, sub.name, sub.birth_tick, sub.popularity
    ):
        g = _entity_rng(seed, cfg.name, int(eid))
        if g.random() >= cfg.coverage or birth > tick:
            continue
        # per-source deletion event
        if g.random() < cfg.delete_prob:
            delete_tick = int(g.integers(1, max(2, n_ticks)))
            if tick >= delete_tick:
                continue
        local_id = f"{cfg.name}:{eid}"

        def render_name(gg: np.random.Generator) -> str:
            nm = name
            al = uni.aliases_of(int(eid))
            if len(al) > 1 and gg.random() < cfg.alias_prob:
                nm = al[int(gg.integers(len(al)))]
            if gg.random() < cfg.typo_prob:
                nm = _typo(gg, nm)
            return nm

        def one_record(rec_id: str, gg: np.random.Generator) -> None:
            row: dict = {"id": rec_id, cfg.col("name"): render_name(gg), cfg.col("type"): etype}
            e_attrs = attrs_by_eid.get(int(eid))
            if e_attrs is not None:
                for pred, obj, obj_eid in zip(
                    e_attrs.predicate, e_attrs.obj, e_attrs.obj_eid
                ):
                    if gg.random() < cfg.missing_prob:
                        continue
                    val = obj
                    # one-time revision after a drawn update tick
                    if pred in _UPDATABLE and gg.random() < cfg.update_prob:
                        upd_tick = int(gg.integers(1, max(2, n_ticks)))
                        revised = f"{obj}~r{upd_tick}"
                        if tick >= upd_tick:
                            val = revised
                    if gg.random() < cfg.error_prob:
                        val = f"{val}!err"
                    if pred == "full_title" and cfg.split_full_title:
                        t1, _, t2 = val.partition(": ")
                        row[cfg.col("title")] = t1
                        row[cfg.col("subtitle")] = t2
                        continue
                    row[cfg.col(pred)] = val
            ent_rows.append(row)
            e_rels = rels_by_eid.get(int(eid))
            if e_rels is not None:
                for pred, r_idx, r_pred, obj in zip(
                    e_rels.predicate, e_rels.r_idx, e_rels.r_predicate, e_rels.obj
                ):
                    if gg.random() < cfg.missing_prob:
                        continue
                    rel_rows.append((rec_id, pred, int(r_idx), r_pred, obj))
            truth_rows.append((rec_id, int(eid)))

        one_record(local_id, g)
        # in-source duplicate record under a different local id (§2.3)
        if g.random() < cfg.dup_prob:
            one_record(f"{cfg.name}:d{eid}", g)
        # volatile popularity: changes every tick by construction
        gpop = np.random.default_rng([seed, _h(cfg.name), int(eid), tick])
        pop_rows.append((local_id, round(float(pop) * (0.8 + 0.4 * gpop.random()), 6)))

    entities = pd.DataFrame(ent_rows)
    # a provider always publishes its full column set, even if all-null
    for pred in _source_columns(cfg):
        if pred not in entities.columns:
            entities[pred] = None
    rels = pd.DataFrame(
        rel_rows, columns=["id", "predicate", "r_idx", "r_predicate", "obj"]
    )
    popularity = pd.DataFrame(pop_rows, columns=["id", "popularity"])
    truth = pd.DataFrame(truth_rows, columns=["id", "eid"]).drop_duplicates()
    return SourceSnapshot(cfg.name, tick, entities, rels, popularity, truth)


def _source_columns(cfg: SourceConfig) -> list[str]:
    """The full wide-column vocabulary this source publishes."""
    cols = {"id", cfg.col("name"), cfg.col("type")}
    for t in cfg.types:
        for pred in S.all_predicates(t):
            if pred == "full_title" and cfg.split_full_title:
                cols.update({cfg.col("title"), cfg.col("subtitle")})
            else:
                cols.add(cfg.col(pred))
    return sorted(cols)


# -- a standard fleet of providers for experiments ---------------------------

def default_sources(*, saga_tick: int = 4, n_legacy: int = 3) -> list[SourceConfig]:
    """Provider fleet for the growth experiment (Fig 12).

    ``n_legacy`` sources exist from tick 0 (the pre-Saga era); after
    ``saga_tick`` self-serve onboarding (§1 req. 5) brings in the remaining
    providers at a fast cadence — reproducing the inflection in Fig 12.
    """
    fleet = [
        SourceConfig("wiki", ("person", "artist", "movie", "city", "org", "team"),
                     coverage=0.55, trust=0.85),
        SourceConfig("musicdb", ("artist", "song", "album"), coverage=0.75, trust=0.9,
                     column_map={"name": "title", "genre": "style"}),
        SourceConfig("moviedb", ("movie", "person"), coverage=0.6, trust=0.8,
                     column_map={"genre": "category"}, split_full_title=True),
        SourceConfig("geodb", ("city", "org"), coverage=0.9, trust=0.95,
                     column_map={"name": "place_name"}),
        SourceConfig("sportsdb", ("team", "city"), coverage=0.8, trust=0.9),
        SourceConfig("celebdb", ("person", "artist"), coverage=0.5, trust=0.7,
                     typo_prob=0.15, error_prob=0.08),
        SourceConfig("tunes", ("song", "album", "artist"), coverage=0.65, trust=0.85,
                     column_map={"name": "track_name"}),
        SourceConfig("encyc", ("person", "movie", "org", "city"), coverage=0.45,
                     trust=0.75),
    ]
    for i, cfg in enumerate(fleet):
        onboard = 0 if i < n_legacy else saga_tick + (i - n_legacy)
        object.__setattr__(cfg, "onboard_tick", onboard)
    return fleet
