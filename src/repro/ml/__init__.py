"""Graph machine learning (§5): string similarities (deterministic and
learned), the NERD stack, and knowledge-graph embeddings."""
