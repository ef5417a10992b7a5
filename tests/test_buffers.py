"""Summation buffers (Section V-A): buffered == unbuffered, bit for bit."""
import numpy as np
import pytest

from repro.core import BufferedGroupedAcc, GroupedBinnedAcc
from repro.synth_data import np_groupby_input


def bits(a: np.ndarray) -> np.ndarray:
    return a.view(np.int64) if a.dtype == np.float64 else a.view(np.int32)


@pytest.mark.parametrize("dtype", [np.float32, np.float64])
@pytest.mark.parametrize("bsz", [1, 2, 7, 64, 256, 4096])
def test_buffered_equals_unbuffered(dtype, bsz):
    keys, vals = np_groupby_input(20000, 33, dist="mixed", dtype=dtype, seed=bsz)
    ref = GroupedBinnedAcc(L=2, dtype=dtype, dense_n_groups=33).update(keys, vals)
    buf = BufferedGroupedAcc(L=2, dtype=dtype, dense_n_groups=33, bsz=bsz)
    buf.update(keys, vals)
    assert np.array_equal(bits(buf.finalize()), bits(ref.finalize()))


@pytest.mark.parametrize("L", [1, 2, 4])
def test_batch_split_invariance(L):
    keys, vals = np_groupby_input(15000, 10, dist="uniform12", seed=L)
    ref = BufferedGroupedAcc(L=L, dense_n_groups=10, bsz=128).update(keys, vals)
    acc = BufferedGroupedAcc(L=L, dense_n_groups=10, bsz=128)
    for ks, vs in zip(np.array_split(keys, 23), np.array_split(vals, 23)):
        acc.update(ks, vs)
    assert np.array_equal(bits(acc.finalize()), bits(ref.finalize()))


def test_skewed_single_group_overruns_buffer_many_times():
    """One group receives a whole batch much larger than bsz."""
    vals = np.random.default_rng(0).random(5000) + 1
    keys = np.zeros(5000, np.int64)
    ref = GroupedBinnedAcc(L=2, dense_n_groups=1).update(keys, vals)
    buf = BufferedGroupedAcc(L=2, dense_n_groups=1, bsz=16).update(keys, vals)
    assert np.array_equal(bits(buf.finalize()), bits(ref.finalize()))


def test_partial_buffers_flushed_on_finalize():
    buf = BufferedGroupedAcc(L=2, dense_n_groups=2, bsz=1000)
    buf.update(np.array([0, 1, 0]), np.array([1.5, 2.5, 3.0]))
    out = buf.finalize()[:, 0]
    assert out[0] == 4.5 and out[1] == 2.5


def test_merge_buffered_with_buffered_and_unbuffered():
    keys, vals = np_groupby_input(12000, 17, dist="mixed", seed=9)
    ref = GroupedBinnedAcc(L=2, dense_n_groups=17).update(keys, vals)
    a = BufferedGroupedAcc(L=2, dense_n_groups=17, bsz=32).update(keys[:5000], vals[:5000])
    b = BufferedGroupedAcc(L=2, dense_n_groups=17, bsz=64).update(keys[5000:], vals[5000:])
    assert np.array_equal(bits(a.merge(b).finalize()), bits(ref.finalize()))
    c = BufferedGroupedAcc(L=2, dense_n_groups=17, bsz=32).update(keys[:5000], vals[:5000])
    d = GroupedBinnedAcc(L=2, dense_n_groups=17).update(keys[5000:], vals[5000:])
    assert np.array_equal(bits(c.merge(d).finalize()), bits(ref.finalize()))


def test_keyed_mode_with_growth():
    rng = np.random.default_rng(4)
    keys = rng.choice([f"k{i}" for i in range(40)], 6000)
    vals = rng.random(6000)
    ref = GroupedBinnedAcc(L=2).update(keys, vals)
    buf = BufferedGroupedAcc(L=2, bsz=8)
    for ks, vs in zip(np.array_split(keys, 6), np.array_split(vals, 6)):
        buf.update(ks, vs)
    got = dict(zip(buf.keys().tolist(), buf.finalize()[:, 0]))
    want = dict(zip(ref.keys().tolist(), ref.finalize()[:, 0]))
    assert got == want


def test_multicolumn_buffers():
    keys, v1 = np_groupby_input(9000, 12, dist="uniform12", seed=1)
    _, v2 = np_groupby_input(9000, 12, dist="exp1", seed=2)
    vals = np.column_stack([v1, v2])
    ref = GroupedBinnedAcc(L=2, ncols=2, dense_n_groups=12).update(keys, vals)
    buf = BufferedGroupedAcc(L=2, ncols=2, dense_n_groups=12, bsz=50).update(keys, vals)
    assert np.array_equal(bits(buf.finalize()), bits(ref.finalize()))


def test_rejects_bad_bsz():
    with pytest.raises(ValueError):
        BufferedGroupedAcc(bsz=0)
