"""Table III benchmark subset: aggregation slowdown of reproducibility.

The full sweep (all L, both widths, 10 group counts) is produced by
``jobs/table3_slowdown.py``; this pytest-benchmark file covers the
representative corners so regressions show up in CI-style runs:
built-in floats vs repro with/without summation buffers at small,
medium and large group counts.
"""
import numpy as np
import pytest

from repro.aggregate import partition_and_aggregate
from repro.synth_data import np_groupby_input

N = 1 << 20
GROUPS = {"G=2^4": 1 << 4, "G=2^12": 1 << 12, "G=2^18": 1 << 18}


@pytest.fixture(scope="module", params=list(GROUPS), ids=list(GROUPS))
def workload(request):
    G = GROUPS[request.param]
    keys, vals = np_groupby_input(N, G, dist="uniform12", seed=1)
    return G, keys, vals


def _run(keys, vals, G, kind, **kw):
    return partition_and_aggregate(keys, vals, G, kind=kind, **kw)


@pytest.mark.benchmark(group="table3")
def bench_builtin_double(benchmark, workload):
    G, keys, vals = workload
    benchmark.pedantic(_run, args=(keys, vals, G, "builtin"), rounds=3,
                       warmup_rounds=1)


@pytest.mark.parametrize("L", [2, 4])
@pytest.mark.benchmark(group="table3")
def bench_repro_unbuffered(benchmark, workload, L):
    G, keys, vals = workload
    benchmark.pedantic(_run, args=(keys, vals, G, "repro"),
                       kwargs={"L": L}, rounds=3, warmup_rounds=1)


@pytest.mark.parametrize("L", [2, 4])
@pytest.mark.benchmark(group="table3")
def bench_repro_buffered(benchmark, workload, L):
    G, keys, vals = workload
    benchmark.pedantic(_run, args=(keys, vals, G, "repro_buffered"),
                       kwargs={"L": L}, rounds=3, warmup_rounds=1)
