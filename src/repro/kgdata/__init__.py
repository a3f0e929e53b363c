"""Synthetic knowledge-graph world.

Replaces the paper's proprietary data feeds (Wikidata, music/sports/media
providers) with a deterministic generated universe of typed entities, noisy
per-provider snapshots over a timeline, and a text-mention corpus — see
DESIGN.md §3 (substitutions) and §6 (data & determinism).
"""
from repro.kgdata.universe import Universe, make_universe  # noqa: F401
from repro.kgdata.sources import SourceConfig, source_snapshot  # noqa: F401
