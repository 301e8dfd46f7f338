"""Reproduce paper Fig. 7: execution + planning time vs re-optimization
threshold τ ∈ {2, 4, 8, 16, 32, 64, 128}, against PG and perfect-(17).

The paper's findings to check: low thresholds barely hurt (τ=2 within
~10% of the best), high thresholds degenerate to PG, and the best τ
sits in the middle of the sweep.
"""
from _common import build_world, parse_args


def main() -> None:
    args = parse_args(__doc__)
    _, _, harness, specs = build_world(args)
    from repro.bench.harness import Config, PERFECT, PG, total_times

    thresholds = [2.0, 4.0, 8.0, 16.0, 32.0, 64.0, 128.0]
    configs = [PG, PERFECT] + [
        Config(f"reopt-{int(t)}", reopt_threshold=t) for t in thresholds
    ]
    res = harness.run_workload(specs, configs)
    tot_pg = total_times(res["pg"])[0]
    print(f"{'config':>12} | {'exec (sim units)':>16} | {'planning s':>10} | vs PG")
    print("-" * 60)
    for c in configs:
        ex, pl = total_times(res[c.name])
        print(
            f"{c.name:>12} | {ex:>16.4g} | {pl:>10.2f} | "
            f"{100 * (1 - ex / tot_pg):+.1f}%"
        )
    best = min(
        (c.name for c in configs if c.name.startswith("reopt")),
        key=lambda n: total_times(res[n])[0],
    )
    print(f"\nbest threshold: {best} (paper: τ=32 best, τ=2 within ~10%)")


if __name__ == "__main__":
    main()
