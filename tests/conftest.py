"""Session-scoped lake fixtures shared by Spark-dependent tests.

The ``spark`` fixture itself comes from the repository-root conftest.
"""
import pytest


@pytest.fixture(scope="session")
def prod_lake(spark, tmp_path_factory):
    """Production-like lake at unit-test scale (~10k event rows)."""
    from repro.workload.tables import build_production_lake

    root = tmp_path_factory.mktemp("prod_lake")
    return build_production_lake(spark, root, scale=0.25, seed=0)


@pytest.fixture(scope="session")
def tpch_lake(spark, tmp_path_factory):
    """TPC-H-lite lake at SF 0.01, clustered per §8.3."""
    from repro.workload.tpch import build_tpch_lake

    root = tmp_path_factory.mktemp("tpch_lake")
    return build_tpch_lake(spark, root, sf=0.01, seed=0)
