"""E0 benchmark — §2.4: incremental vs full-batch construction."""
from repro.experiments import e0_incremental as exp


def test_e0_incremental_vs_rebuild(benchmark, tuned_spark, report):
    result = benchmark.pedantic(
        lambda: exp.run(tuned_spark, n_entities=12000, n_sources=2),
        rounds=1, iterations=1,
    )
    report(exp.format_rows(result))
    assert result["speedup"] > 1.5  # delta consumption beats full rebuild
