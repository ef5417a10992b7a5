"""Summation-routine benchmarks (the Figure 6 micro-benchmark, chunked RSUM).

Compares conventional summation (np.sum — the std::accumulate analogue)
with the vectorized reproducible routine called in chunks of ``c``
values, mimicking how the aggregation operators alternate between
groups. The paper's shape: small chunks pay a start-up cost per call;
by c≈512 the routine approaches its single-call (c=inf) throughput.
"""
import numpy as np
import pytest

from repro.core import BinnedSum

N = 1 << 20


@pytest.fixture(scope="module")
def data():
    return np.random.default_rng(0).random(N) + 1.0


def _rsum_chunked(v: np.ndarray, L: int, c: int) -> float:
    b = BinnedSum(L=L)
    for i in range(0, v.size, c):
        b.add_vector(v[i : i + c])
    return float(b.finalize())


@pytest.mark.benchmark(group="rsum-conv")
def bench_conventional_sum(benchmark, data):
    benchmark(lambda: float(np.sum(data)))


@pytest.mark.parametrize("c", [16, 512, N], ids=["c=16", "c=512", "c=inf"])
@pytest.mark.parametrize("L", [2, 3])
@pytest.mark.benchmark(group="rsum-chunked")
def bench_rsum_chunked(benchmark, data, L, c):
    result = benchmark.pedantic(
        _rsum_chunked, args=(data, L, c), rounds=3, warmup_rounds=1
    )
    assert abs(result - float(np.sum(data))) < 1e-5
