"""Benchmark + reproduction of the paper's Fig. 1 claim, on REAL Spark.

Executes the longest executable queries (ranked by PG simulated time,
as the paper ranks by observed PG latency) as physical Spark DataFrame
join trees under PG estimates, perfect-(17), and re-optimization
(τ=32, with real temp-table materialization), and compares total
wall-clock. Paper: re-optimization improves the top-20 longest queries
by 27%, perfect estimates by ~35%.

Spark wall-clock at laptop scale is noisy and per-stage overhead
compresses ratios (DESIGN.md §3.5), so the assertion is only on the
*ordering* of totals, not the exact percentages.
"""
import os

import pytest

from repro.core.executor import SparkExecutor

#: how many of the longest queries to execute; override for quick runs.
TOP_N = int(os.environ.get("REPRO_BENCH_TOPN", "10"))
#: skip queries whose true result exceeds this (inexecutable monsters).
MAX_ROWS = float(os.environ.get("REPRO_BENCH_MAXROWS", "5e5"))


@pytest.fixture(scope="module")
def executor(spark, bench_ds):
    return SparkExecutor(spark, bench_ds)


def test_top_queries_spark_wall_clock(
    benchmark, bench_harness, bench_specs, full_results, executor, capsys
):
    executable = [
        q for q in bench_specs if bench_harness.oracle.card(q) <= MAX_ROWS
    ]
    top = sorted(
        executable, key=lambda q: -full_results["pg"][q.name].sim_time
    )[:TOP_N]

    walls: dict[str, float] = {}

    def run_all():
        for cfg in ("pg", "perfect-17", "reopt-32"):
            total = 0.0
            for q in top:
                run = bench_harness.execute_spark(
                    q, full_results[cfg][q.name], executor
                )
                total += run.wall_time
            walls[cfg] = total
        return walls

    benchmark.pedantic(run_all, rounds=1, iterations=1)

    with capsys.disabled():
        print()
        print(f"top-{len(top)} longest executable queries, Spark wall-clock:")
        for cfg, w in walls.items():
            print(f"  {cfg:>12}: {w:7.1f}s")
        pg_w = walls["pg"]
        print(
            f"  improvement vs PG: perfect "
            f"{100 * (1 - walls['perfect-17'] / pg_w):.0f}% (paper ~35%), "
            f"reopt {100 * (1 - walls['reopt-32'] / pg_w):.0f}% (paper 27%)"
        )
    # Ordering claim: perfect <= pg, and reopt lands below pg too.
    assert walls["perfect-17"] < walls["pg"] * 1.05
    assert walls["reopt-32"] < walls["pg"] * 1.05
