"""E6 benchmark — §5.1: learned vs deterministic string similarity."""
from repro.experiments import e6_sim as exp


def test_e6_learned_similarity(benchmark, report):
    result = benchmark.pedantic(
        lambda: exp.run(n_entities=800), rounds=1, iterations=1
    )
    report(exp.format_rows(result))
    assert any(p["improvement_points"] > 20 for p in result["points"])
