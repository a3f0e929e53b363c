"""E7 benchmark — §4.2/§6.1: live KG query latency (p95 < 20 ms)."""
from repro.experiments import e7_live as exp


def test_e7_live_latency(benchmark, report):
    result = benchmark.pedantic(
        lambda: exp.run(n_entities=2000, n_queries=2000), rounds=1, iterations=1
    )
    report(exp.format_rows(result))
    assert result["p95_ms"] < 20.0
