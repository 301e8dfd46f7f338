"""Reproduce paper Fig. 2 and Fig. 8: workload execution time under
perfect-(n) for n = 0..17, with and without re-optimization (τ=32).

Findings to check (paper): perfect-(1..3) ≈ no benefit; a marked drop
at perfect-(4); re-optimization helps every n below ~5 and stops
mattering once estimates are near-perfect.
"""
from _common import build_world, parse_args


def main() -> None:
    args = parse_args(__doc__)
    _, _, harness, specs = build_world(args)
    from repro.bench.harness import Config, total_times

    ns = [0, 1, 2, 3, 4, 5, 6, 8, 10, 13, 17]
    configs = []
    for n in ns:
        configs.append(Config(f"perfect-{n}", perfect_n=n))
        configs.append(
            Config(f"perfect-{n}+reopt", perfect_n=n, reopt_threshold=32.0)
        )
    res = harness.run_workload(specs, configs)
    print(f"{'n':>4} | {'perfect-(n)':>14} | {'+reopt(32)':>14} | reopt gain")
    print("-" * 56)
    for n in ns:
        a = total_times(res[f"perfect-{n}"])[0]
        b = total_times(res[f"perfect-{n}+reopt"])[0]
        print(f"{n:>4} | {a:>14.4g} | {b:>14.4g} | {100 * (1 - b / a):+.1f}%")


if __name__ == "__main__":
    main()
