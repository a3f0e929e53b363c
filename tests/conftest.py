"""Shared test fixtures.

Imported by pytest before the session ``spark`` fixture is instantiated,
so the shuffle-partition override below reaches the root conftest.  Heavy
deterministic artifacts (universe, ground-truth KG) are session-scoped.
"""
import os

# loaded at collection time, before the root conftest's fixture body runs:
# reproduction-scale data wants few shuffle partitions (per-task overhead
# dominates in this sandbox)
os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pytest  # noqa: E402

from repro.kgdata.universe import make_universe  # noqa: E402


@pytest.fixture(scope="session")
def uni():
    """Small deterministic ground-truth world shared across tests."""
    return make_universe(n_entities=300, seed=7)


@pytest.fixture(scope="session")
def uni_mid():
    """Mid-size world for accuracy-shape tests."""
    return make_universe(n_entities=600, seed=7)


@pytest.fixture(scope="session")
def tuned_spark(spark):
    """The session SparkSession with reproduction-scale settings applied."""
    from repro.sparktune import tune

    return tune(spark)


@pytest.fixture(scope="session")
def small_kg(tuned_spark, uni):
    """Fused ground-truth KG (extended triples) over ``uni``."""
    from repro.experiments.common import kg_from_universe

    return kg_from_universe(tuned_spark, uni).localCheckpoint(eager=True)
