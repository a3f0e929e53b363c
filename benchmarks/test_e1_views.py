"""E1 benchmark — Fig 8: view computation, analytics store vs legacy."""
from repro.experiments import e1_views as exp


def test_e1_view_computation(benchmark, tuned_spark, report):
    result = benchmark.pedantic(
        lambda: exp.run(tuned_spark, n_entities=60000, reps=2), rounds=1, iterations=1
    )
    report(exp.format_rows(result))
    assert result["worst_speedup"] > 1.0  # paper: no view regressed
    assert result["avg_speedup"] > 1.5
    # join-heavy person view gains more than the sparse city view (Fig 8 shape)
    per = {v["view"]: v["speedup"] for v in result["per_view"]}
    assert per["person"] > per["city"]
