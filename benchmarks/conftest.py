"""Benchmark-scale lake fixtures (SF≈0.1-equivalent data volumes).

The production-like lake is built at scale 10 (~400k event rows across
400 micro-partitions); TPC-H-lite at SF 0.1 (600k lineitem rows).
Fixtures are session-scoped — the build cost is paid once, outside the
benchmarked sections.  Each benchmark writes its paper-vs-ours table to
``benchmarks/results/`` and prints it (visible with ``pytest -s``).
"""
from pathlib import Path

import pytest

RESULTS_DIR = Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def bench_prod_lake(spark, tmp_path_factory):
    from repro.workload.tables import build_production_lake

    root = tmp_path_factory.mktemp("bench_prod_lake")
    return build_production_lake(spark, root, scale=10.0, seed=0)


@pytest.fixture(scope="session")
def bench_tpch_lake(spark, tmp_path_factory):
    from repro.workload.tpch import build_tpch_lake

    root = tmp_path_factory.mktemp("bench_tpch_lake")
    return build_tpch_lake(spark, root, sf=0.1, seed=0)


def record(results_dir: Path, name: str, text: str) -> None:
    """Persist + print one rendered result table."""
    (results_dir / f"{name}.txt").write_text(text + "\n")
    print(f"\n=== {name} ===\n{text}")
