"""Empirical accuracy of RSUM on the Table II workloads (Section VI-B)."""
import math
import sys
from pathlib import Path

import numpy as np
import pytest

from repro.core import BinnedSum, conventional_bound, rsum_bound

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))
import table2_error_bounds  # noqa: E402


def _draw(dist, n, seed):
    g = np.random.default_rng(seed)
    return g.random(n) + 1.0 if dist == "U[1,2)" else g.exponential(1.0, n)


@pytest.mark.parametrize("dist", ["U[1,2)", "Exp(1)"])
@pytest.mark.parametrize("n", [10**3, 10**5])
@pytest.mark.parametrize("L", [1, 2, 3])
def test_measured_error_within_eq6(dist, n, L):
    v = _draw(dist, n, seed=n + L)
    exact = math.fsum(v.tolist())
    got = float(BinnedSum(L=L).add_vector(v).finalize())
    assert abs(got - exact) <= rsum_bound(n, float(v.max()), L)


@pytest.mark.parametrize("dist", ["U[1,2)", "Exp(1)"])
@pytest.mark.parametrize("n", [10**3, 10**5])
def test_conventional_error_within_eq5(dist, n):
    v = _draw(dist, n, seed=n)
    exact = math.fsum(v.tolist())
    err = abs(float(np.add.reduce(v)) - exact)
    assert err <= conventional_bound(n, float(np.abs(v).sum()))


@pytest.mark.parametrize("dist", ["U[1,2)", "Exp(1)"])
def test_l2_accuracy_comparable_to_conventional(dist):
    """Table II conclusion: RSUM L=2 has accuracy comparable to
    conventional summation (both far below the worst-case bounds)."""
    n = 10**5
    v = _draw(dist, n, seed=17)
    exact = math.fsum(v.tolist())
    e2 = abs(float(BinnedSum(L=2).add_vector(v).finalize()) - exact)
    # actual error stays well within Eq. 5's conventional bound
    assert e2 <= conventional_bound(n, float(np.abs(v).sum()))


def test_l3_much_more_accurate_than_ieee():
    """'higher accuracy than IEEE numbers at essentially the same price'."""
    n = 10**5
    v = _draw("Exp(1)", n, seed=23)
    exact = math.fsum(v.tolist())
    e3 = abs(float(BinnedSum(L=3).add_vector(v).finalize()) - exact)
    assert e3 <= 1e-10


class TestTable2Job:
    def test_measured_errors_structure(self):
        m = table2_error_bounds.measured_errors(ns=(100,), Ls=(1, 2), reps=1)
        assert ("Conventional", "U[1,2)", 100) in m
        assert ("RSUM (L=2)", "Exp(1)", 100) in m

    def test_main_runs(self, monkeypatch, capsys):
        monkeypatch.setenv("QUICK", "1")
        assert table2_error_bounds.main() == 0
        out = capsys.readouterr().out
        assert "Table II" in out and "within their analytic bounds" in out
