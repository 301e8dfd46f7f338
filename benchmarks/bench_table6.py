"""Benchmark + reproduction of paper Table VI.

Times one full re-optimization loop (the longest PG query, τ=32:
plan → trigger → virtual temp → replan, repeated to quiescence) and
prints the whole-workload table, paper vs ours.
"""
from repro.bench import tables as T
from repro.bench.harness import REOPT32, total_times


def test_table6_reopt_vs_perfect(
    benchmark, bench_harness, bench_specs, full_results, capsys
):
    pg = full_results["pg"]
    pf = full_results["perfect-17"]
    ro = full_results["reopt-32"]
    longest = max(bench_specs, key=lambda q: pg[q.name].sim_time)

    benchmark.pedantic(
        lambda: bench_harness.run_query(longest, REOPT32),
        rounds=3,
        iterations=1,
    )

    ours = T.table6(ro, pf)
    with capsys.disabled():
        print()
        print(
            T.render(
                "TABLE VI — re-optimized runtime relative to perfect-(17)",
                ours,
                T.PAPER_TABLE6,
                "rel. runtime",
            )
        )
        tot_pg, tot_pf, tot_ro = (total_times(r)[0] for r in (pg, pf, ro))
        print(
            f"reopt improvement vs PG: {100 * (1 - tot_ro / tot_pg):.1f}% "
            f"(paper: 45%); fraction of perfect's benefit: "
            f"{(tot_pg - tot_ro) / (tot_pg - tot_pf):.2f} (paper: >0.5)"
        )
    t2 = T.table2(pg, pf)
    # re-optimization moves mass toward 0.8-1.2 and shrinks the tail
    assert ours["0.8 - 1.2"] > t2["0.8 - 1.2"]
    assert (
        ours["2.0 - 5.0"] + ours["> 5.0"]
        < t2["2.0 - 5.0"] + t2["> 5.0"]
    )
