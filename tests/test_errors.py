"""Eq. 5 / Eq. 6 bound formulas and the analytic Table II values."""
import numpy as np
import pytest

from repro.core import conventional_bound, machine_eps, rsum_bound, table2_rows

#: Table II as printed in the paper (double precision).
PAPER_TABLE2 = {
    ("Conventional", "U[1,2)", 10**3): 1.7e-10,
    ("Conventional", "Exp(1)", 10**3): 1.1e-10,
    ("Conventional", "U[1,2)", 10**6): 1.7e-4,
    ("Conventional", "Exp(1)", 10**6): 1.1e-4,
    ("RSUM (L=1)", "U[1,2)", 10**3): 1.0e3,
    ("RSUM (L=1)", "Exp(1)", 10**3): 1.1e4,
    ("RSUM (L=1)", "U[1,2)", 10**6): 1.0e6,
    ("RSUM (L=1)", "Exp(1)", 10**6): 1.1e7,
    ("RSUM (L=2)", "U[1,2)", 10**3): 9.1e-10,
    ("RSUM (L=2)", "Exp(1)", 10**3): 1.0e-8,
    ("RSUM (L=2)", "U[1,2)", 10**6): 9.1e-7,
    ("RSUM (L=2)", "Exp(1)", 10**6): 1.0e-5,
    ("RSUM (L=3)", "U[1,2)", 10**3): 8.3e-22,
    ("RSUM (L=3)", "Exp(1)", 10**3): 9.1e-21,
    ("RSUM (L=3)", "U[1,2)", 10**6): 8.3e-19,
    ("RSUM (L=3)", "Exp(1)", 10**6): 9.1e-18,
}


def test_machine_eps():
    assert machine_eps(np.float64) == 2.0**-53
    assert machine_eps(np.float32) == 2.0**-24


def test_conventional_bound_formula():
    # (n-1) * eps * sum|b|
    assert conventional_bound(1000, 1500.0) == 999 * 2.0**-53 * 1500.0


@pytest.mark.parametrize("L", [1, 2, 3, 4])
def test_rsum_bound_formula(L):
    assert rsum_bound(10**6, 22.0, L) == 10**6 * 2.0 ** ((1 - L) * 40 - 1) * 22.0


def test_bounds_shrink_with_L():
    bs = [rsum_bound(1000, 2.0, L) for L in (1, 2, 3, 4)]
    assert bs[0] > bs[1] > bs[2] > bs[3]
    assert bs[0] / bs[1] == 2.0**40  # each level gains W bits


@pytest.mark.parametrize("key,paper", sorted(PAPER_TABLE2.items(), key=str))
def test_table2_matches_paper(key, paper):
    """Our analytic Table II equals the paper's to its printed precision."""
    ours = table2_rows()[key]
    assert ours == pytest.approx(paper, rel=0.05), (key, ours, paper)


def test_l1_bound_comparable_to_result_magnitude():
    """The paper's observation: the L=1 uncertainty can be as large as
    the result itself (Exp(1): bound 1.1e4 vs expected sum 1e3)."""
    n = 10**3
    assert rsum_bound(n, 22.0, 1) >= 1.0 * n  # Exp(1) expected |sum| = n
