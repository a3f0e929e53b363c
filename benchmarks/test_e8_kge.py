"""E8 benchmark — §5.3: KG-embedding fact tasks."""
from repro.experiments import e8_kge as exp


def test_e8_embeddings(benchmark, report):
    result = benchmark.pedantic(
        lambda: exp.run(n_entities=800, epochs=60, dim=48), rounds=1, iterations=1
    )
    report(exp.format_rows(result))
    for m in result["models"].values():
        # far above the 0.5 chance line; TransE's 1-N weakness caps it
        # below DistMult on this relation mix
        assert m["verification_auc"] > 0.8
        assert m["imputation_hits@10"] > 0.6
