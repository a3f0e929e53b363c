"""Knowledge Graph Query Engine (§3): primary store, view computation and
query APIs over a (laptop-scale) federated polystore."""
