"""Shared helpers for spark-submit job entrypoints.

Each ``jobs/table*.py`` reproduces one evaluation artifact (DESIGN.md
§4): it builds the required lake at the requested scale, runs the
harness from :mod:`repro.experiments`, and prints the paper-vs-ours
table.  Run as ``spark-submit jobs/<name>.py [args]`` or plain
``python jobs/<name>.py`` (a local session is created either way).
"""
from __future__ import annotations

import argparse
import tempfile

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--scale", type=float, default=10.0,
                   help="production-lake scale (10 ≈ benchmark size)")
    p.add_argument("--sf", type=float, default=0.1,
                   help="TPC-H-lite scale factor")
    p.add_argument("--n", type=int, default=None,
                   help="number of workload queries (harness default)")
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--data-dir", default=None,
                   help="where to materialize the lake (default: temp)")
    return p


def data_dir(args) -> str:
    return args.data_dir or tempfile.mkdtemp(prefix="repro_lake_")


def prod_lake(spark: SparkSession, args):
    from repro.workload.tables import build_production_lake

    return build_production_lake(
        spark, data_dir(args), scale=args.scale, seed=args.seed
    )


def tpch_lake(spark: SparkSession, args):
    from repro.workload.tpch import build_tpch_lake

    return build_tpch_lake(spark, data_dir(args), sf=args.sf, seed=args.seed)
