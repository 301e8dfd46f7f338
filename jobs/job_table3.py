"""Reproduce paper Table III: # queries with a given number of tables.

The JOB-lite workload generator targets this distribution exactly; the
job re-derives it from the generated specs rather than echoing the
target constant.
"""
from _common import build_world, parse_args


def main() -> None:
    args = parse_args(__doc__)
    *_, specs = build_world(args)
    from repro.bench import tables as T

    print(
        T.render(
            "TABLE III — queries per relation count",
            T.table3(specs),
            T.PAPER_TABLE3,
            "# tables",
        )
    )


if __name__ == "__main__":
    main()
