"""Experiment harnesses reproducing the paper's quantitative results.

One module per evaluation artifact (see DESIGN.md §4 and EXPERIMENTS.md):
E0 incremental-vs-batch construction, E1 view computation (Fig 8),
E2 view-dependency reuse (§3.2), E3 KG growth (Fig 12), E4 NERD text
annotation (Fig 14a), E5 object resolution (Fig 14b), E6 learned string
similarity (§5.1), E7 live-graph query latency (§4.2/§6.1), E8 KG
embeddings (§5.3).  Each module exposes ``run(...) -> dict`` and
``format_rows(result) -> str`` so jobs and benchmarks print identical
tables.
"""
