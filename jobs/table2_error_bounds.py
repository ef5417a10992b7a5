"""Table II — maximum absolute error of conventional vs reproducible summation.

Prints two blocks:

1. the *analytic* expected error bounds (Eq. 5 / Eq. 6), which are what
   the paper's Table II tabulates — these must match the paper to the
   printed precision, since they are closed-form;
2. *measured* maximum absolute errors of this repo's implementation
   (|result - math.fsum|) over ``reps`` random draws per configuration,
   plus the worst conventional left-to-right error over random
   permutations — confirming the bounds hold and that L=2 is comparable
   to conventional double summation while L=3 is far tighter.

Run: ``python jobs/table2_error_bounds.py`` (no Spark needed).
"""
import math
import os
import sys

import numpy as np

from repro.core import BinnedSum, conventional_bound, rsum_bound, table2_rows


def _draw(dist: str, n: int, seed: int) -> np.ndarray:
    g = np.random.default_rng(seed)
    return g.random(n) + 1.0 if dist == "U[1,2)" else g.exponential(1.0, n)


def measured_errors(ns=(10**3, 10**6), Ls=(1, 2, 3), reps: int = 3):
    """{(algorithm, dist, n): measured max abs error vs math.fsum}."""
    out = {}
    for n in ns:
        for dist in ("U[1,2)", "Exp(1)"):
            conv_err, rsum_err = 0.0, {L: 0.0 for L in Ls}
            for rep in range(reps):
                v = _draw(dist, n, seed=1000 * rep + n % 997)
                exact = math.fsum(v.tolist())
                for p in range(3):
                    vp = np.random.default_rng(p).permutation(v)
                    conv_err = max(conv_err, abs(float(np.add.reduce(vp)) - exact))
                for L in Ls:
                    r = float(BinnedSum(L=L).add_vector(v).finalize())
                    rsum_err[L] = max(rsum_err[L], abs(r - exact))
            out[("Conventional", dist, n)] = conv_err
            for L in Ls:
                out[(f"RSUM (L={L})", dist, n)] = rsum_err[L]
    return out


def fmt_table(rows, ns, title):
    algos = ["Conventional", "RSUM (L=1)", "RSUM (L=2)", "RSUM (L=3)"]
    heads = [f"{dist} n={n:.0e}" for n in ns for dist in ("U[1,2)", "Exp(1)")]
    lines = [title, f"{'':14s}" + "".join(f"{h:>15s}" for h in heads)]
    for a in algos:
        cells = [
            f"{rows[(a, dist, n)]:15.1e}"
            for n in ns for dist in ("U[1,2)", "Exp(1)")
        ]
        lines.append(f"{a:14s}" + "".join(cells))
    return "\n".join(lines)


def main():
    ns = (10**3, 10**6)
    quick = os.environ.get("QUICK") == "1"
    print(fmt_table(table2_rows(ns=ns), ns,
                    "Analytic expected error bounds (Eq. 5 / Eq. 6) — Table II:"))
    print()
    meas = measured_errors(ns=ns, reps=1 if quick else 3)
    print(fmt_table(meas, ns, "Measured max |error| vs math.fsum:"))
    # bound check: every measured RSUM error within its Eq. 6 bound
    for (algo, dist, n), err in meas.items():
        if algo.startswith("RSUM"):
            L = int(algo[-2])
            maxv = 2.0 if dist == "U[1,2)" else 22.0
            assert err <= rsum_bound(n, maxv, L), (algo, dist, n, err)
        else:
            mean = 1.5 if dist == "U[1,2)" else 1.0
            assert err <= conventional_bound(n, mean * n), (algo, dist, n)
    print("\nAll measured errors within their analytic bounds.")
    return 0


if __name__ == "__main__":
    sys.exit(main())
