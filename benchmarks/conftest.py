"""Session fixtures for the benchmark suite (SF=0.1 by default).

``REPRO_BENCH_SF`` overrides the scale factor (the table shapes are
scale-free; 0.1 is the documented bench point, ~1M rows total).
"""
import os

import pytest

from repro.bench.harness import Harness
from repro.core.stats import analyze_pandas
from repro.imdb import gen, workload

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))
SEED = 42


@pytest.fixture(scope="session")
def bench_ds():
    return gen.generate(sf=BENCH_SF, seed=SEED)


@pytest.fixture(scope="session")
def bench_catalog(bench_ds):
    return analyze_pandas(bench_ds)


@pytest.fixture(scope="session")
def bench_harness(bench_ds, bench_catalog):
    return Harness(bench_ds, bench_catalog)


@pytest.fixture(scope="session")
def bench_specs():
    return workload.job_lite_workload()


@pytest.fixture(scope="session")
def full_results(bench_harness, bench_specs):
    """One 3-config pass over all 113 queries, shared by the table
    benchmarks so the expensive run happens once per session."""
    from repro.bench.harness import PERFECT, PG, REOPT32

    return bench_harness.run_workload(bench_specs, [PG, PERFECT, REOPT32])
