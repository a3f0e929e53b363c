"""E2 benchmark — §3.2: 26% improvement from view-dependency reuse."""
from repro.experiments import e2_view_reuse as exp


def test_e2_view_reuse(benchmark, tuned_spark, report):
    result = benchmark.pedantic(
        lambda: exp.run(tuned_spark, n_entities=2500, reps=2), rounds=1, iterations=1
    )
    report(exp.format_rows(result))
    assert result["improvement_pct"] > 10.0
