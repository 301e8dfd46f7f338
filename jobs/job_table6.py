"""Reproduce paper Table VI: JOB runtimes with re-optimization (τ=32)
relative to perfect-(17), bucketed.

Compared to Table II (job_table2.py), mass moves into the 0.8–1.2
bucket and the > 5 tail shrinks — re-optimization fixes most of the
catastrophically planned queries.
"""
from _common import build_world, parse_args


def main() -> None:
    args = parse_args(__doc__)
    _, _, harness, specs = build_world(args)
    from repro.bench import tables as T
    from repro.bench.harness import PERFECT, PG, REOPT32, total_times

    res = harness.run_workload(specs, [PG, PERFECT, REOPT32])
    pg, pf, ro = res["pg"], res["perfect-17"], res["reopt-32"]
    print(
        T.render(
            "TABLE VI — re-optimized runtime relative to perfect-(17)",
            T.table6(ro, pf),
            T.PAPER_TABLE6,
            "rel. runtime",
        )
    )
    print(
        T.render(
            "\n(for contrast) TABLE II — PG relative to perfect-(17)",
            T.table2(pg, pf),
            T.PAPER_TABLE2,
            "rel. runtime",
        )
    )
    tot_pg, tot_pf, tot_ro = (total_times(r)[0] for r in (pg, pf, ro))
    print(
        f"\nreopt improves the whole benchmark by "
        f"{100 * (1 - tot_ro / tot_pg):.1f}% over PG (paper: 45%), "
        f"capturing {(tot_pg - tot_ro) / (tot_pg - tot_pf):.0%} of the "
        f"benefit of perfect estimates (paper: 'more than half')"
    )


if __name__ == "__main__":
    main()
