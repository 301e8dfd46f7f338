"""Shared plumbing for the spark-submit job entrypoints.

Each job reproduces one table/figure of the paper. Jobs run standalone
(``python jobs/job_table2.py`` or ``spark-submit jobs/job_table2.py``)
and print the paper's numbers next to ours.
"""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def parse_args(description: str, **extra) -> argparse.Namespace:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--sf", type=float, default=0.01, help="scale factor")
    p.add_argument("--seed", type=int, default=42, help="data seed")
    p.add_argument(
        "--spark-analyze",
        action="store_true",
        help="build statistics with Spark aggregations instead of pandas",
    )
    for name, kw in extra.items():
        p.add_argument(f"--{name.replace('_', '-')}", **kw)
    return p.parse_args()


def get_spark():
    """A SparkSession configured like the test fixture (conftest.py)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def build_world(args):
    """(dataset, catalog, harness, workload) for a job run."""
    from repro.bench.harness import Harness
    from repro.core.stats import analyze, analyze_pandas
    from repro.imdb import gen, workload

    ds = gen.generate(sf=args.sf, seed=args.seed)
    if args.spark_analyze:
        catalog = analyze(get_spark(), ds)
    else:
        catalog = analyze_pandas(ds)
    return ds, catalog, Harness(ds, catalog), workload.job_lite_workload()
