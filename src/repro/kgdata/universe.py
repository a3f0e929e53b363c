"""Ground-truth entity universe generator.

Produces a deterministic world of typed entities with canonical names,
aliases (including nickname synonyms for people), literal attributes,
entity-valued relations, composite one-hop relationships, popularity, and a
"birth tick" for timeline experiments.  Providers (``kgdata.sources``)
render noisy views of this world; having the ground truth lets the
reproduction *measure* linking / NERD accuracy, which the paper could not
publish for its proprietary feeds.

Everything here is driver-side pandas/numpy (the world is the experiment's
random seed, not the workload); Spark DataFrames are derived downstream.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core import schema as S

# -- name material ----------------------------------------------------------

_FIRST_NAMES = [
    "Robert", "William", "Elizabeth", "Margaret", "James", "Katherine",
    "Michael", "Jennifer", "Richard", "Patricia", "Thomas", "Barbara",
    "Charles", "Susan", "Joseph", "Jessica", "Edward", "Dorothy",
    "Anthony", "Rebecca", "Steven", "Sandra", "Daniel", "Nancy",
    "Alexander", "Victoria", "Benjamin", "Samantha", "Nicholas", "Christina",
]

#: nickname synonym map — the "Robert ~ Bob" signal (§5.1) that q-gram
#: similarity cannot capture but distant-supervised embeddings can.
NICKNAMES = {
    "Robert": "Bob", "William": "Bill", "Elizabeth": "Liz",
    "Margaret": "Peggy", "James": "Jim", "Katherine": "Kate",
    "Michael": "Mike", "Jennifer": "Jen", "Richard": "Dick",
    "Patricia": "Trish", "Thomas": "Tom", "Barbara": "Babs",
    "Charles": "Chuck", "Susan": "Sue", "Joseph": "Joe",
    "Jessica": "Jess", "Edward": "Ted", "Dorothy": "Dot",
    "Anthony": "Tony", "Rebecca": "Becky", "Steven": "Steve",
    "Sandra": "Sandy", "Daniel": "Dan", "Nancy": "Nan",
    "Alexander": "Alex", "Victoria": "Vicky", "Benjamin": "Ben",
    "Samantha": "Sam", "Nicholas": "Nick", "Christina": "Tina",
}

_SYLLABLES = [
    "han", "over", "spring", "field", "clar", "mont", "bruns", "wick",
    "dart", "mouth", "ard", "more", "fair", "view", "lake", "wood",
    "ash", "ton", "bel", "ville", "crest", "dale", "glen", "ridge",
    "north", "port", "west", "ham", "east", "ley",
]

_GENRES = ["rock", "pop", "jazz", "folk", "electronic", "classical", "hiphop", "country"]
_OCCUPATIONS = ["singer", "actor", "writer", "director", "producer", "athlete", "scientist"]
_COUNTRIES = ["US", "DE", "FR", "UK", "CA", "JP", "BR", "IN"]
_TIMEZONES = ["UTC-8", "UTC-5", "UTC", "UTC+1", "UTC+5", "UTC+9"]
_SPORTS = ["basketball", "soccer", "baseball", "hockey"]
_ORG_TYPES = ["university", "college", "company", "label"]
_DEGREES = ["BA", "BSc", "MSc", "PhD", "MBA"]
_AWARDS = ["Golden Reel", "Silver Frame", "Critics Prize"]
_LABELS = ["Bluebird Records", "Northside Music", "Crescent Audio", "Harbor Sound"]

#: default mix of entity types in the world
TYPE_MIX = [
    ("person", 0.28), ("artist", 0.10), ("song", 0.20), ("album", 0.08),
    ("movie", 0.12), ("city", 0.10), ("team", 0.06), ("org", 0.06),
]


#: fixed surname pool — small enough that surname collisions occur, which
#: gives the learned-similarity experiment hard negatives ("Robert Ashton"
#: vs "Susan Ashton") that q-gram similarity cannot separate from nickname
#: synonyms ("Bob Ashton").
_SURNAMES = [
    "Ashton", "Belmore", "Crestley", "Danworth", "Eastley", "Fairbanks",
    "Glenwood", "Hartmont", "Ironside", "Jessop", "Kingsley", "Lakefield",
    "Marwick", "Northam", "Overton", "Pembroke", "Quillan", "Ridgeway",
    "Springer", "Thornton", "Underhill", "Vance", "Westbrook", "Yardley",
]


def _word(g: np.random.Generator, n_syll: int = 2) -> str:
    w = "".join(g.choice(_SYLLABLES) for _ in range(n_syll))
    return w.capitalize()


def _person_name(g: np.random.Generator) -> str:
    return f"{g.choice(_FIRST_NAMES)} {g.choice(_SURNAMES)}"


def _title(g: np.random.Generator) -> str:
    return f"{_word(g)} {_word(g)}"


@dataclass
class Universe:
    """The ground-truth world.

    Attributes
    ----------
    entities : pandas frame (eid, type, name, popularity, birth_tick, description)
    aliases : pandas frame (eid, alias) — includes the canonical name
    attrs : pandas frame (eid, predicate, obj, obj_eid) — ``obj_eid`` is the
        referenced entity id for entity-valued predicates, else None.
    rels : pandas frame (eid, predicate, r_idx, r_predicate, obj, obj_eid)
        — composite one-hop relationships (Fig 2 ``educated_at``).
    ambiguous_families : list of lists of eids that share a canonical name
        (head entity first).  Drives the NERD head/tail experiments.
    """

    entities: pd.DataFrame
    aliases: pd.DataFrame
    attrs: pd.DataFrame
    rels: pd.DataFrame
    ambiguous_families: list[list[int]] = field(default_factory=list)

    # -- convenience lookups -------------------------------------------
    def name_of(self, eid: int) -> str:
        return self._names[eid]

    def type_of(self, eid: int) -> str:
        return self._types[eid]

    def popularity_of(self, eid: int) -> float:
        return self._pops[eid]

    def aliases_of(self, eid: int) -> list[str]:
        return self._alias_map.get(eid, [self._names[eid]])

    def neighbors_of(self, eid: int) -> list[int]:
        """Entity ids adjacent to ``eid`` (out-refs, in-refs, composite refs)."""
        return self._nbrs.get(eid, [])

    def __post_init__(self) -> None:
        self._names = dict(zip(self.entities.eid, self.entities.name))
        self._types = dict(zip(self.entities.eid, self.entities.type))
        self._pops = dict(zip(self.entities.eid, self.entities.popularity))
        self._alias_map = {
            eid: sorted(grp.alias.tolist())
            for eid, grp in self.aliases.groupby("eid")
        }
        nbrs: dict[int, set[int]] = {}
        ref_rows = pd.concat(
            [
                self.attrs.loc[self.attrs.obj_eid.notna(), ["eid", "obj_eid"]],
                self.rels.loc[self.rels.obj_eid.notna(), ["eid", "obj_eid"]],
            ]
        )
        for a, b in zip(ref_rows.eid, ref_rows.obj_eid):
            b = int(b)
            nbrs.setdefault(a, set()).add(b)
            nbrs.setdefault(b, set()).add(a)
        self._nbrs = {k: sorted(v) for k, v in nbrs.items()}


def make_universe(
    *,
    n_entities: int = 500,
    seed: int = 7,
    n_ticks: int = 12,
    growth: float = 0.05,
    ambig_frac: float = 0.08,
    cross_type_ambig: int = 6,
) -> Universe:
    """Generate a deterministic world.

    Parameters
    ----------
    n_entities : world size.
    n_ticks : timeline length; ``growth`` of entities are born per tick > 0.
    ambig_frac : fraction of entities pulled into same-name families
        (one popular *head*, one or two unpopular *tails* — the
        Hanover-NH-vs-Hanover-DE situation of §5.2).
    cross_type_ambig : number of name collisions *across* entity types
        (city vs movie vs team) — drives the type-hint experiment (Fig 14b).
    """
    g = np.random.default_rng(seed)

    # -- entities: type, name, popularity, birth tick -------------------
    types_, probs = zip(*TYPE_MIX)
    etypes = g.choice(types_, size=n_entities, p=np.array(probs) / sum(probs))
    names = []
    for t in etypes:
        names.append(_person_name(g) if t in S.PERSON_TYPES else _title(g))

    # popularity: zipfian over a random permutation of ranks
    ranks = g.permutation(np.arange(1, n_entities + 1))
    popularity = (1.0 / ranks**0.8).round(6)

    # birth ticks: most entities exist at tick 0, 'growth' fraction per tick
    birth = np.zeros(n_entities, dtype=int)
    n_new = int(n_entities * growth)
    pool = g.permutation(n_entities)
    cursor = 0
    for t in range(1, n_ticks):
        birth[pool[cursor : cursor + n_new]] = t
        cursor += n_new

    eids = np.arange(n_entities)
    ent = pd.DataFrame(
        {
            "eid": eids,
            "type": etypes,
            "name": names,
            "popularity": popularity,
            "birth_tick": birth,
        }
    )

    # -- controlled same-type ambiguity families ------------------------
    # an entity joins at most one family, so renames never break an
    # earlier family's shared-name invariant
    families: list[list[int]] = []
    used: set[int] = set()
    by_type: dict[str, list[int]] = {
        t: ent.loc[ent.type == t].sort_values("popularity", ascending=False).eid.tolist()
        for t in dict(TYPE_MIX)
    }
    n_fam = max(1, int(n_entities * ambig_frac / 2))
    for t in ("city", "person", "movie", "org"):
        cands = [e for e in by_type.get(t, []) if e not in used]
        take = min(n_fam // 2 + 1, len(cands) // 4)
        for i in range(take):
            head = cands[i]  # popular
            tail = cands[-(i + 1)]  # unpopular
            if head == tail:
                continue
            ent.loc[ent.eid == tail, "name"] = ent.loc[ent.eid == head, "name"].iloc[0]
            families.append([head, tail])
            used.update((head, tail))

    # -- cross-type collisions (city name == movie title == team name) --
    city_ids = [e for e in by_type.get("city", []) if e not in used]
    other_pool = [
        e
        for t in ("movie", "team", "album")
        for e in by_type.get(t, [])
        if e not in used
    ]
    for i in range(min(cross_type_ambig, len(city_ids), len(other_pool))):
        c, o = city_ids[i], other_pool[i]
        ent.loc[ent.eid == o, "name"] = ent.loc[ent.eid == c, "name"].iloc[0]
        fam = sorted([c, o], key=lambda e: -popularity[e])
        families.append(fam)
        used.update(fam)
    names = dict(zip(ent.eid, ent.name))

    # -- aliases ---------------------------------------------------------
    alias_rows: list[tuple[int, str]] = []
    for eid, t, nm in zip(ent.eid, ent.type, ent.name):
        alias_rows.append((eid, nm))
        if t in S.PERSON_TYPES:
            first, rest = nm.split(" ", 1)
            if first in NICKNAMES:
                alias_rows.append((eid, f"{NICKNAMES[first]} {rest}"))
        elif g.random() < 0.3:  # "The X" style alias for titles
            alias_rows.append((eid, f"The {nm}"))
    aliases = pd.DataFrame(alias_rows, columns=["eid", "alias"]).drop_duplicates()

    # -- literal + ref attributes ---------------------------------------
    id_by_type = {t: ent.loc[ent.type == t].eid.to_numpy() for t in dict(TYPE_MIX)}

    def _pick(t: str, not_eid: int) -> int | None:
        arr = id_by_type.get(t)
        if arr is None or len(arr) == 0:
            return None
        v = int(arr[g.integers(len(arr))])
        return None if v == not_eid else v

    attr_rows: list[tuple[int, str, str, object]] = []
    rel_rows: list[tuple[int, str, int, str, str, object]] = []
    ref_target = {
        "birthplace": "city", "spouse": "person", "by_artist": "artist",
        "directed_by": "person", "home_city": "city", "in_city": "city",
    }

    def _lit(pred: str) -> str:
        if pred == "birthdate":
            return f"19{g.integers(40, 100)}-{g.integers(1, 13):02d}-{g.integers(1, 29):02d}"
        if pred == "occupation":
            return str(g.choice(_OCCUPATIONS))
        if pred == "genre":
            return str(g.choice(_GENRES))
        if pred == "record_label":
            return str(g.choice(_LABELS))
        if pred == "release_year":
            return str(g.integers(1950, 2023))
        if pred == "duration":
            return str(g.integers(90, 600))
        if pred == "country":
            return str(g.choice(_COUNTRIES))
        if pred == "timezone":
            return str(g.choice(_TIMEZONES))
        if pred == "sport":
            return str(g.choice(_SPORTS))
        if pred == "org_type":
            return str(g.choice(_ORG_TYPES))
        raise ValueError(pred)

    for eid, t in zip(ent.eid, ent.type):
        for pred in S.literal_predicates(t):
            if pred == "full_title":
                attr_rows.append((eid, pred, f"{names[eid]}: The Movie", None))
            else:
                attr_rows.append((eid, pred, _lit(pred), None))
        for pred in S.ref_predicates(t):
            tgt = _pick(ref_target[pred], eid)
            if tgt is not None and g.random() < 0.85:
                attr_rows.append((eid, pred, names[tgt], tgt))
        for pred, rpreds in S.COMPOSITE_RELS.get(t, {}).items():
            if g.random() < 0.6:
                n_rel = int(g.integers(1, 3))
                for r_idx in range(n_rel):
                    org = _pick("org", eid)
                    vals = {
                        "school": (names[org], org) if org is not None else None,
                        "degree": (str(g.choice(_DEGREES)), None),
                        "year": (str(g.integers(1960, 2021)), None),
                        "award": (str(g.choice(_AWARDS)), None),
                        "category": (str(g.choice(_GENRES)), None),
                    }
                    for rp in rpreds:
                        v = vals.get(rp)
                        if v is not None:
                            rel_rows.append((eid, pred, r_idx, rp, v[0], v[1]))

    attrs = pd.DataFrame(attr_rows, columns=["eid", "predicate", "obj", "obj_eid"])
    rels = pd.DataFrame(
        rel_rows, columns=["eid", "predicate", "r_idx", "r_predicate", "obj", "obj_eid"]
    )
    return Universe(
        entities=ent, aliases=aliases, attrs=attrs, rels=rels,
        ambiguous_families=families,
    )
