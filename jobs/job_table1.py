"""Reproduce paper Table I: # cardinality estimates on joins of N tables.

Plans all 113 JOB-lite queries with the PostgreSQL-style estimator and
counts one estimate per connected subset ("joinrel") the planner
considered, grouped by subset size. The shape to match: a hump peaking
around 8-way joins with a sharp taper at the largest sizes.
"""
from _common import build_world, parse_args


def main() -> None:
    args = parse_args(__doc__)
    _, catalog, harness, specs = build_world(args)
    from repro.bench import tables as T

    ours = T.table1(specs, harness.estimator(None), harness.cost)
    print(
        T.render(
            "TABLE I — cardinality estimates by join size",
            ours,
            T.PAPER_TABLE1,
            "# tables in join",
        )
    )


if __name__ == "__main__":
    main()
