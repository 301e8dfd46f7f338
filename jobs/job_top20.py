"""Reproduce the paper's Fig. 1 / abstract claim with REAL Spark runs:
end-to-end latency of the top-20 longest queries under PG estimates,
perfect-(17), and re-optimization (τ=32).

The paper reports ~27% improvement from re-optimization and ~35% from
perfect estimates on the top-20 (execution time, cached plans). Here
each chosen plan is executed as a Spark DataFrame join tree (shuffle
joins, broadcast disabled) and wall-clock is measured; re-optimized
queries physically materialize their temp tables in Spark.

Queries whose true result size exceeds ``--max-rows`` are skipped (a
handful of JOB-lite monsters would take minutes under ANY plan at
bench scale; the simulated-time jobs cover them).
"""
from _common import build_world, get_spark, parse_args


def main() -> None:
    args = parse_args(
        __doc__,
        top=dict(type=int, default=20, help="how many longest queries"),
        max_rows=dict(type=float, default=3e6, help="skip larger true results"),
    )
    ds, _, harness, specs = build_world(args)
    from repro.bench.harness import PERFECT, PG, REOPT32
    from repro.core.executor import SparkExecutor

    spark = get_spark()
    executor = SparkExecutor(spark, ds)

    # Rank by PG simulated time among executable queries, as the paper
    # ranks by observed PG execution time.
    sim = harness.run_workload(specs, [PG, PERFECT, REOPT32])
    executable = [
        q for q in specs if harness.oracle.card(q) <= args.max_rows
    ]
    top = sorted(
        executable, key=lambda q: -sim["pg"][q.name].sim_time
    )[: args.top]
    print(f"executing top {len(top)} of {len(executable)} executable queries")

    walls = {c: 0.0 for c in ("pg", "perfect-17", "reopt-32")}
    for q in top:
        for cfg in ("pg", "perfect-17", "reopt-32"):
            run = harness.execute_spark(q, sim[cfg][q.name], executor)
            walls[cfg] += run.wall_time
        print(
            f"  {q.name}: pg={sim['pg'][q.name].wall_time:.2f}s "
            f"perfect={sim['perfect-17'][q.name].wall_time:.2f}s "
            f"reopt={sim['reopt-32'][q.name].wall_time:.2f}s"
        )
    pg_w = walls["pg"]
    print(
        f"\ntop-{len(top)} totals: pg={pg_w:.1f}s "
        f"perfect-17={walls['perfect-17']:.1f}s "
        f"reopt-32={walls['reopt-32']:.1f}s"
    )
    print(
        f"improvement vs PG: perfect {100 * (1 - walls['perfect-17'] / pg_w):.0f}% "
        f"(paper ~35%), reopt {100 * (1 - walls['reopt-32'] / pg_w):.0f}% "
        f"(paper 27%)"
    )


if __name__ == "__main__":
    main()
