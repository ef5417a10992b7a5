"""Accumulator backends: builtin, DECIMAL(p), repro (un)buffered."""
import math

import numpy as np
import pytest

from repro.aggregate import make_acc
from repro.synth_data import np_groupby_input


class TestBuiltin:
    def test_matches_numpy_scatter(self):
        keys, vals = np_groupby_input(5000, 16, seed=1)
        acc = make_acc("builtin", 16)
        acc.update(keys, vals)
        ref = np.zeros(16)
        np.add.at(ref, keys, vals)
        assert np.array_equal(acc.finalize(), ref)

    def test_float32_table(self):
        acc = make_acc("builtin", 4, dtype=np.float32)
        acc.update(np.array([0, 0]), np.array([1.5, 2.5]))
        assert acc.table.dtype == np.float32
        assert acc.finalize()[0] == 4.0

    def test_merge_from_stride(self):
        a = make_acc("builtin", 8)
        b = make_acc("builtin", 2)
        b.update(np.array([0, 1]), np.array([1.0, 2.0]))
        a.merge_from(b, base=3, stride=4)  # local i -> 3 + 4i
        out = a.finalize()
        assert out[3] == 1.0 and out[7] == 2.0 and out.sum() == 3.0


class TestDecimal:
    @pytest.mark.parametrize("p", [9, 19, 38])
    def test_exact_on_prices(self, p):
        keys, vals = np_groupby_input(20000, 32, dist="prices", seed=p)
        acc = make_acc("decimal", 32, p=p)
        acc.update(keys, vals)
        want = [round(math.fsum(np.round(vals[keys == k] * 100).tolist()))
                for k in range(32)]
        if p == 9:  # int32 storage may wrap for large groups — skip exactness
            want32 = [np.int32(w) for w in want]
            assert acc.exact_ints() == [int(w) for w in want32]
        else:
            assert acc.exact_ints() == want

    @pytest.mark.parametrize("p", [19, 38])
    def test_reproducible_by_construction(self, p):
        keys, vals = np_groupby_input(10000, 8, dist="prices", seed=3)
        a = make_acc("decimal", 8, p=p)
        a.update(keys, vals)
        perm = np.random.default_rng(0).permutation(keys.size)
        b = make_acc("decimal", 8, p=p)
        b.update(keys[perm], vals[perm])
        assert a.result_bits() == b.result_bits()

    def test_storage_widths(self):
        assert make_acc("decimal", 1, p=9).table.dtype == np.int32
        assert make_acc("decimal", 1, p=19).table.dtype == np.int64
        assert make_acc("decimal", 1, p=38)._two_limb

    def test_two_limb_carries(self):
        acc = make_acc("decimal", 1, p=38, frac=0)
        big = float(2**40)
        acc.update(np.zeros(4096, np.int64), np.full(4096, big))
        assert acc.exact_ints()[0] == 4096 * 2**40

    def test_cannot_represent_wide_dynamic_range(self):
        """The paper's point (Section II-C): fixed-point loses tiny values."""
        acc = make_acc("decimal", 1, p=19, frac=2)
        acc.update(np.array([0, 0]), np.array([1e-6, 1e-6]))
        assert acc.finalize()[0] == 0.0  # rounded away at scale 10**2


class TestRepro:
    @pytest.mark.parametrize("kind", ["repro", "repro_buffered"])
    @pytest.mark.parametrize("L", [1, 2, 4])
    def test_bits_stable_under_permutation(self, kind, L):
        keys, vals = np_groupby_input(8000, 25, dist="mixed", seed=L)
        kw = {"L": L} if kind == "repro" else {"L": L, "bsz": 19}
        a = make_acc(kind, 25, **kw)
        a.update(keys, vals)
        perm = np.random.default_rng(1).permutation(keys.size)
        b = make_acc(kind, 25, **kw)
        b.update(keys[perm], vals[perm])
        assert a.result_bits() == b.result_bits()

    def test_buffered_equals_unbuffered_bits(self):
        keys, vals = np_groupby_input(8000, 25, dist="mixed", seed=7)
        a = make_acc("repro", 25, L=3)
        a.update(keys, vals)
        b = make_acc("repro_buffered", 25, L=3, bsz=41)
        b.update(keys, vals)
        assert a.result_bits() == b.result_bits()

    def test_float32_finalize_dtype(self):
        acc = make_acc("repro", 4, dtype=np.float32, L=2)
        acc.update(np.array([1]), np.array([2.5], np.float32))
        assert acc.finalize()[1] == 2.5


def test_make_acc_unknown_kind():
    with pytest.raises(KeyError):
        make_acc("nope", 1)
