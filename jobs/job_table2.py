"""Reproduce paper Table II: JOB runtimes with PG estimates relative to
perfect-(17), bucketed {0.1–0.8, 0.8–1.2, 1.2–2.0, 2.0–5.0, >5.0}.

Runs the full workload under both configs (shared true-cardinality
oracle) and buckets the per-query simulated-runtime ratios.
"""
from _common import build_world, parse_args


def main() -> None:
    args = parse_args(__doc__)
    _, _, harness, specs = build_world(args)
    from repro.bench import tables as T
    from repro.bench.harness import PERFECT, PG, total_times

    res = harness.run_workload(specs, [PG, PERFECT])
    pg, pf = res["pg"], res["perfect-17"]
    print(
        T.render(
            "TABLE II — PG runtime relative to perfect-(17)",
            T.table2(pg, pf),
            T.PAPER_TABLE2,
            "rel. runtime",
        )
    )
    tot_pg, tot_pf = total_times(pg)[0], total_times(pf)[0]
    print(
        f"\nwhole-benchmark simulated execution: pg={tot_pg:.4g} "
        f"perfect-17={tot_pf:.4g} ({tot_pg / tot_pf:.2f}x; paper: ~2x)"
    )


if __name__ == "__main__":
    main()
