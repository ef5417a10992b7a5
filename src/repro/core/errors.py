"""Error-bound formulas of Section VI-B (Table II).

Eq. 5 — conventional floating-point summation (Demmel & Nguyen [13]):
``e_conv = (n-1) * eps * sum_i |b_i|``.

Eq. 6 — RSUM with L levels (Demmel & Nguyen [14]):
``e_rsum = n * 2**((1-L)*W - 1) * max_i |b_i|``.

Table II evaluates the *expected* bounds for two input distributions:
U[1,2) (``E[sum|b|] = 1.5 n``, ``max <= 2``) and Exp(1)
(``E[sum|b|] = n``, max-expected value 22 — the paper's choice: for
n = 10^6 draws, P[any value > 22] < 0.03 %).
"""
from __future__ import annotations

import numpy as np

from .params import fmt_for

__all__ = [
    "machine_eps",
    "conventional_bound",
    "rsum_bound",
    "DISTRIBUTIONS",
    "table2_rows",
]


def machine_eps(dtype=np.float64) -> float:
    """Unit roundoff ``2**-(m+1)`` (2**-53 for double, 2**-24 for single)."""
    return 2.0 ** -(fmt_for(dtype).m + 1)


def conventional_bound(n: int, sum_abs: float, dtype=np.float64) -> float:
    """Eq. 5: worst-case absolute error of conventional summation."""
    return (n - 1) * machine_eps(dtype) * sum_abs


def rsum_bound(n: int, max_abs: float, L: int, dtype=np.float64) -> float:
    """Eq. 6: worst-case absolute error of RSUM with L levels."""
    W = fmt_for(dtype).W
    return n * 2.0 ** ((1 - L) * W - 1) * max_abs


#: name -> (expected sum|b| per element, max expected |b|) as in Table II.
DISTRIBUTIONS = {
    "U[1,2)": (1.5, 2.0),
    "Exp(1)": (1.0, 22.0),
}


def table2_rows(ns=(10**3, 10**6), Ls=(1, 2, 3), dtype=np.float64):
    """The analytic Table II: {(algorithm, dist, n): bound}.

    Algorithms: "Conventional" (Eq. 5) and "RSUM (L=k)" (Eq. 6).
    """
    rows = {}
    for n in ns:
        for dist, (mean_abs, max_abs) in DISTRIBUTIONS.items():
            rows[("Conventional", dist, n)] = conventional_bound(
                n, mean_abs * n, dtype
            )
            for L in Ls:
                rows[(f"RSUM (L={L})", dist, n)] = rsum_bound(n, max_abs, L, dtype)
    return rows
