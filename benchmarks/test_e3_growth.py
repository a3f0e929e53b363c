"""E3 benchmark — Fig 12: relative KG growth under continuous construction."""
from repro.experiments import e3_growth as exp


def test_e3_kg_growth(benchmark, tuned_spark, report):
    result = benchmark.pedantic(
        lambda: exp.run(tuned_spark, n_entities=300, n_ticks=8, saga_tick=3),
        rounds=1, iterations=1,
    )
    quality = exp.linking_quality(result)
    report(
        exp.format_rows(result)
        + f"linking quality (ground truth): {quality}\n"
    )
    assert result["facts_growth"] > result["entities_growth"] > 1.0
    assert quality["clusters_with_mixed_truth"] / max(1, quality["clusters"]) < 0.05
