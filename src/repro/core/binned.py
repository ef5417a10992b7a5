"""The reproducible, associative summation state (``repro<ScalarT,L>``).

This module implements the paper's reproducible floating-point type
(Section IV) on top of the binned/level decomposition of Section III:

* every input value is split, by error-free transformations against a
  ladder of extractors ``M_l = 1.5 * 2**(e_top - l*W)``, into per-level
  *contributions* that are integer multiples of the level's grid
  ``2**(e_l - m)``;
* per-level totals are therefore **exact** integer sums — independent of
  arrival order and of how the input stream is split across batches,
  partitions, or Spark tasks;
* the retained window is the top ``L`` levels anchored at the natural
  bin of the running maximum; merging two states aligns levels on the
  shared global grid and adds exactly.

State layout (per group, per value column): window top exponent
``e_top`` (``EMPTY_E`` until a nonzero value is seen), ``dev[L]`` — the
running sum's deviation from ``1.5*ufp`` in integer grid units — and
carry counters ``C[L]`` (units of ``0.25*ufp``, the paper's carry-bit
count). ``S^(l) = 1.5*2**(e_l) + dev_l * 2**(e_l - m)``; the paper's
invariant ``S in [1.5, 1.75)*ufp(S)`` is ``dev in [0, 2**(m-2))``.
Keeping ``dev``/``C`` as int64 makes every accumulation step exact by
construction; renormalisation (the paper's carry-bit propagation) is a
presentation-layer step performed before export/merge/finalise. The
float-state reference of Algorithm 2 lives in ``rsum_scalar.py`` and is
tested to agree bit-for-bit.
"""
from __future__ import annotations

import numpy as np

from .params import EMPTY_E, FloatFormat, fmt_for

__all__ = [
    "deposit_units",
    "renorm",
    "finalize_state",
    "BinnedSum",
    "GroupedBinnedAcc",
]


def deposit_units(fmt: FloatFormat, L: int, values: np.ndarray, e_top: np.ndarray):
    """Split ``values`` into per-level contributions, in integer grid units.

    ``e_top`` is the per-element window-top exponent (already >= each
    value's natural bin). Returns an int64 array of shape ``(L, n)``
    where row ``l`` holds each value's contribution to level ``l`` in
    units of ``2**(e_top - l*W - m)``. The chain of error-free
    transformations is computed in ``fmt.dtype`` arithmetic, so the
    decomposition is bit-identical to the scalar reference.
    """
    v = np.asarray(values, dtype=fmt.dtype)
    e = np.asarray(e_top, dtype=np.int64)
    one = fmt.dtype.type(1.5)
    M = np.ldexp(one, e.astype(np.int32))
    units = np.empty((L, v.size), np.int64)
    r = v
    for lev in range(L):
        q = (r + M) - M  # error-free extraction: q = round(r, grid_l)
        scale = (fmt.m - e + lev * fmt.W).astype(np.int32)
        units[lev] = np.ldexp(q, scale).astype(np.int64)  # exact integers
        r = r - q  # exact remainder
        if lev + 1 < L:
            M = np.ldexp(M, np.int32(-fmt.W))
    return units


def renorm(dev: np.ndarray, C: np.ndarray, fmt: FloatFormat) -> None:
    """Carry-bit propagation: restore ``dev in [0, 2**(m-2))`` in place.

    Mirrors Algorithm 2 lines 14–18: move whole multiples of
    ``0.25*ufp = 2**(m-2)`` grid units from the running sum into the
    carry counter. Floor division handles negative deviations (mixed
    signs in the input) exactly.
    """
    cap = np.int64(1) << (fmt.m - 2)
    carry = np.floor_divide(dev, cap)
    C += carry
    dev -= carry * cap


def finalize_state(fmt: FloatFormat, L: int, e_top, dev, C):
    """Finalisation sum (paper Section III-C): lowest level first.

    ``Q = sum_l ((S_l - 1.5*ufp_l) + 0.25*ufp_l*C_l)`` evaluated in
    ``fmt.dtype`` from level L up to level 1 to avoid cancellation.
    Accepts per-slot arrays: ``e_top (n,)``, ``dev``/``C`` ``(L, n)``.
    ``dev`` must be renormalised (< 2**(m-2)) so its float image is exact.
    """
    e = np.asarray(e_top, np.int64)
    d = np.asarray(dev, np.int64).reshape(L, -1)
    c = np.asarray(C, np.int64).reshape(L, -1)
    live = e != EMPTY_E
    esafe = np.where(live, e, 0)
    Q = np.zeros(e.shape, fmt.dtype)
    for lev in reversed(range(L)):
        el = (esafe - lev * fmt.W).astype(np.int32)
        term = np.ldexp(c[lev].astype(fmt.dtype), el - 2) + np.ldexp(
            d[lev].astype(fmt.dtype), el - fmt.m
        )
        Q = Q + term
    return np.where(live, Q, fmt.dtype.type(0)).astype(fmt.dtype, copy=False)


def _check_finite(values: np.ndarray) -> None:
    if not np.all(np.isfinite(values)):
        raise ValueError(
            "reproducible summation is defined for finite inputs only "
            "(got NaN/Inf)"
        )


class BinnedSum:
    """Reproducible sum of one stream of numbers (Section III, no grouping).

    The public face of RSUM: `add_vector` is the vectorized batch
    summation (Algorithm 3's role), `add` the per-element path, `merge`
    the associative combine, `finalize` the rounded result. Any split of
    the input into `add_vector`/`add`/`merge` calls, in any order,
    yields bit-identical `finalize()` output.
    """

    def __init__(self, L: int = 2, dtype=np.float64):
        if L < 1:
            raise ValueError("L must be >= 1")
        self.fmt = fmt_for(dtype)
        self.L = L
        self.e_top: int = EMPTY_E
        self.dev = np.zeros(L, np.int64)
        self.C = np.zeros(L, np.int64)
        self._since_renorm = 0

    def _raise_window(self, new_e: int) -> None:
        if self.e_top == EMPTY_E:
            self.e_top = new_e
            return
        if new_e <= self.e_top:
            return
        s = (new_e - self.e_top) // self.fmt.W
        if s >= self.L:
            self.dev[:] = 0
            self.C[:] = 0
        else:
            self.dev[s:] = self.dev[: self.L - s]
            self.dev[:s] = 0
            self.C[s:] = self.C[: self.L - s]
            self.C[:s] = 0
        self.e_top = new_e

    def add_vector(self, values) -> "BinnedSum":
        v = np.asarray(values, dtype=self.fmt.dtype).ravel()
        if v.size == 0:
            return self
        _check_finite(v)
        amax = float(np.max(np.abs(v)))
        if amax > 0:
            req = int(self.fmt.top_exponent(amax))
            self._raise_window(max(req, self.e_top if self.e_top != EMPTY_E else req))
            self.fmt.check_window(self.e_top, self.L)
        if self.e_top == EMPTY_E:  # all zeros so far
            return self
        units = deposit_units(
            self.fmt, self.L, v, np.full(v.size, self.e_top, np.int64)
        )
        self.dev += units.sum(axis=1)
        self._since_renorm += v.size
        if self._since_renorm > (1 << 22):
            renorm(self.dev, self.C, self.fmt)
            self._since_renorm = 0
        return self

    def add(self, x) -> "BinnedSum":
        return self.add_vector(np.asarray([x]))

    def merge(self, other: "BinnedSum") -> "BinnedSum":
        """Associative combine (``operator+=(repro<ScalarT,L>)``)."""
        if other.fmt is not self.fmt or other.L != self.L:
            raise TypeError("cannot merge states with different formats or L")
        if other.e_top == EMPTY_E:
            return self
        renorm(self.dev, self.C, self.fmt)
        odev, oC = other.dev.copy(), other.C.copy()
        renorm(odev, oC, other.fmt)
        target = max(self.e_top, other.e_top) if self.e_top != EMPTY_E else other.e_top
        self._raise_window(target)
        s = (target - other.e_top) // self.fmt.W
        if s < self.L:
            self.dev[s:] += odev[: self.L - s]
            self.C[s:] += oC[: self.L - s]
        self._since_renorm = 0
        renorm(self.dev, self.C, self.fmt)
        return self

    def state(self):
        """(e_top, dev, C) after renormalisation — the canonical bits."""
        renorm(self.dev, self.C, self.fmt)
        self._since_renorm = 0
        return self.e_top, self.dev.copy(), self.C.copy()

    def finalize(self):
        e, d, c = self.state()
        return self.fmt.dtype.type(
            finalize_state(self.fmt, self.L, np.asarray([e]), d[:, None], c[:, None])[0]
        )


class GroupedBinnedAcc:
    """Many reproducible accumulators keyed by group — the GROUPBY state.

    One instance holds, for every group and every value column, a binned
    summation state. Two deposit paths exist:

    * :meth:`update` / :meth:`update_slots` — the *unbuffered* path: one
      gather + L extractions + L scatter-adds **per element**, mirroring
      the cost profile of using ``repro<ScalarT,L>`` as a drop-in
      aggregate type (paper Section IV / Figure 4);
    * :meth:`deposit_rows` — the *buffered* path used by the summation
      buffers of Section V: whole per-group buffers are flushed through
      the contiguous vectorized kernel.

    Keys are either dense ints in ``[0, dense_n_groups)`` (the paper's
    IDENTITYHASHING setup; no lookup cost) or arbitrary hashables mapped
    through an internal index.
    """

    #: optional deposit sub-chunk for the fast path (None = whole batch).
    #: Smaller chunks model smaller summation buffers: the same exact
    #: result with more per-call overhead (Figure 8's left slope).
    FAST_CHUNK: int | None = None

    def __init__(self, *, L: int = 2, dtype=np.float64, ncols: int = 1,
                 dense_n_groups: int | None = None):
        if L < 1 or ncols < 1:
            raise ValueError("L and ncols must be >= 1")
        self.fmt = fmt_for(dtype)
        self.L = L
        self.ncols = ncols
        self._dense = dense_n_groups is not None
        n0 = dense_n_groups or 0
        self._index: dict | None = None if self._dense else {}
        self._keys: list | None = None if self._dense else []
        self.e_top = np.full((ncols, n0), EMPTY_E, np.int64)
        self.dev = np.zeros((ncols, L, n0), np.int64)
        self.C = np.zeros((ncols, L, n0), np.int64)
        self._since_renorm = 0
        # cached window summary per column: the min deposit threshold of
        # live slots (inf if none) and the uniform live exponent (None if
        # mixed). Lets steady-state batches skip the O(n+G) window scan.
        # Recomputed lazily (the scan is O(n_slots)) when marked dirty.
        self._live_thr = [float("inf")] * ncols
        self._uni_e: list[int | None] = [None] * ncols
        self._win_dirty = [False] * ncols

    # ---------------------------------------------------------------- slots
    @property
    def n_slots(self) -> int:
        return self.e_top.shape[1]

    def keys(self) -> np.ndarray:
        if self._dense:
            return np.arange(self.n_slots)
        return np.asarray(self._keys)

    def _grow(self, add: int) -> None:
        if add <= 0:
            return
        self.e_top = np.concatenate(
            [self.e_top, np.full((self.ncols, add), EMPTY_E, np.int64)], axis=1
        )
        self.dev = np.concatenate(
            [self.dev, np.zeros((self.ncols, self.L, add), np.int64)], axis=2
        )
        self.C = np.concatenate(
            [self.C, np.zeros((self.ncols, self.L, add), np.int64)], axis=2
        )

    def slots_for(self, keys: np.ndarray) -> np.ndarray:
        """Map keys to slot ids, allocating slots for unseen keys."""
        keys = np.asarray(keys)
        if self._dense:
            return keys.astype(np.int64, copy=False)
        uniq, inv = np.unique(keys, return_inverse=True)
        lut = np.empty(uniq.size, np.int64)
        n_new = 0
        for i, k in enumerate(uniq.tolist()):
            s = self._index.get(k)
            if s is None:
                s = len(self._index)
                self._index[k] = s
                self._keys.append(k)
                n_new += 1
            lut[i] = s
        self._grow(n_new)
        return lut[inv]

    # -------------------------------------------------------------- windows
    def _refresh_window_cache(self, j: int) -> None:
        self._win_dirty[j] = False
        e = self.e_top[j]
        live = e[e != EMPTY_E]
        if live.size == 0:
            self._live_thr[j] = float("inf")
            self._uni_e[j] = None
            return
        emin = int(live.min())
        emax = int(live.max())
        self._live_thr[j] = 2.0 ** (emin - self.fmt.m + self.fmt.W - 1)
        self._uni_e[j] = emin if emin == emax else None

    def _raise_windows(self, j: int, idx: np.ndarray, req: np.ndarray) -> None:
        """Raise windows of slots ``idx`` (column j) to at least ``req``.

        Level shifts move int64 deviations between levels exactly.
        """
        cur = self.e_top[j, idx]
        empty = cur == EMPTY_E
        self.e_top[j, idx[empty]] = req[empty]
        liveidx = idx[~empty]
        livereq = req[~empty]
        livecur = cur[~empty]
        need = livereq > livecur
        if np.any(need):
            ii = liveidx[need]
            s = (livereq[need] - livecur[need]) // self.fmt.W
            for sv in np.unique(s):
                sel = ii[s == sv]
                if sv >= self.L:
                    self.dev[j][:, sel] = 0
                    self.C[j][:, sel] = 0
                else:
                    self.dev[j][sv:, sel] = self.dev[j][: self.L - sv, sel]
                    self.dev[j][:sv, sel] = 0
                    self.C[j][sv:, sel] = self.C[j][: self.L - sv, sel]
                    self.C[j][:sv, sel] = 0
            self.e_top[j, ii] = livereq[need]
        self.fmt.check_window(self.e_top[j, idx], self.L)
        self._refresh_window_cache(j)

    def _prepare_windows(self, j: int, slots: np.ndarray, absvals: np.ndarray):
        """Per-batch extractor-validity check (Algorithm 3 line 4)."""
        amax = np.zeros(self.n_slots, self.fmt.dtype)
        np.maximum.at(amax, slots, absvals)
        idx = np.flatnonzero(amax > 0)
        if idx.size:
            req = self.fmt.top_exponent(amax[idx])
            self._raise_windows(j, idx, req)
        e = self.e_top[j, slots]
        return np.where(e == EMPTY_E, 0, e)

    # ------------------------------------------------------------- deposits
    def update(self, keys, values, *, fast: bool = True) -> "GroupedBinnedAcc":
        """Deposit a batch of <key, value(s)> pairs.

        ``fast=True`` (default) is the *vectorized batch summation* path
        — the performance realisation of the paper's summation buffers
        in this substrate: the processing batch plays the buffer's role
        and per-level exact partial sums are staged in floats before
        being drained into the canonical int64 state. ``fast=False`` is
        the per-element cost model of the drop-in ``repro<ScalarT,L>``
        type of Section IV (one gather + L generic extractions + L
        scatter-adds per element). Both produce identical bits (tested).
        """
        vals = np.asarray(values)
        if vals.ndim == 1:
            vals = vals[:, None]
        if vals.shape[1] != self.ncols:
            raise ValueError(f"expected {self.ncols} value columns")
        slots = self.slots_for(keys)
        self.update_slots(slots, vals, fast=fast)
        return self

    def update_slots(self, slots: np.ndarray, vals: np.ndarray, *,
                     fast: bool = True) -> None:
        if vals.ndim == 1:
            vals = vals[:, None]
        for j in range(self.ncols):
            v = np.ascontiguousarray(vals[:, j], dtype=self.fmt.dtype)
            if fast:
                # finiteness is checked on max|v| inside the fast path
                # (NaN/Inf propagate through np.max of np.abs)
                self._deposit_fast(j, slots, v)
            else:
                _check_finite(v)
                e = self._prepare_windows(j, slots, np.abs(v))
                units = deposit_units(self.fmt, self.L, v, e)
                for lev in range(self.L):
                    np.add.at(self.dev[j, lev], slots, units[lev])
        self._note_adds(vals.shape[0])

    # ----------------------------------------------------- fast deposit path
    def _deposit_fast(self, j: int, slots: np.ndarray, v: np.ndarray) -> None:
        """Vectorized batch deposit: the summation-buffer flush kernel.

        One pass of error-free extractions per level over the whole
        batch (scalar extractor when all live windows coincide — the
        steady state for same-magnitude data), unit conversion by an
        exact power-of-two scale, and one int64 scatter-add per level.
        Exactness needs no staging bounds: units are integers.
        """
        amax = float(np.max(np.abs(v))) if v.size else 0.0
        if amax == 0.0:
            # zero contributions; keys were materialised by slots_for.
            return
        if not np.isfinite(amax):
            raise ValueError(
                "reproducible summation is defined for finite inputs only "
                "(got NaN/Inf)"
            )
        if self._win_dirty[j]:
            self._refresh_window_cache(j)
        e_arg: int | np.ndarray
        if amax < self._live_thr[j] and self._uni_e[j] is not None:
            # steady state: one shared live window absorbs the batch;
            # only never-seen (EMPTY) slots need initialisation.
            e_gather = self.e_top[j, slots]
            empt = e_gather == EMPTY_E
            if empt.any():
                sub = np.flatnonzero(empt)
                self._prepare_windows(j, slots[sub], np.abs(v[sub]))
            e_arg = self._uni_e[j] if self._uni_e[j] is not None \
                else self.e_top[j, slots]
        else:
            self._prepare_windows(j, slots, np.abs(v))
            ue = self._uni_e[j]
            e_arg = ue if ue is not None else self.e_top[j, slots]
        uniform = np.isscalar(e_arg) or np.ndim(e_arg) == 0
        CH = self.FAST_CHUNK or v.size
        W, m = self.fmt.W, self.fmt.m
        t = self.fmt.dtype.type
        for i in range(0, v.size, CH):
            sl = slots[i:i + CH]
            vv = v[i:i + CH]
            if uniform:
                M = np.ldexp(t(1.5), np.int32(e_arg))
            else:
                ee = e_arg[i:i + CH].astype(np.int32)
                M = np.ldexp(t(1.5), ee)
            r = vv
            for lev in range(self.L):
                q = r + M
                q -= M  # error-free extraction, in fmt.dtype
                if uniform:
                    u = np.ldexp(q, np.int32(m - int(e_arg) + lev * W))
                else:
                    u = np.ldexp(q, (m + lev * W) - ee)
                np.add.at(self.dev[j, lev], sl, u.astype(np.int64))
                if lev + 1 < self.L:
                    r = r - q
                    M = np.ldexp(M, np.int32(-W))

    def deposit_rows(self, j: int, row_slots: np.ndarray, rows: np.ndarray) -> None:
        """Buffered flush: ``rows[i]`` is the (zero-padded) buffer of
        ``row_slots[i]``. ``row_slots`` must be distinct within one call.

        Zero padding is free: zeros contribute nothing to any level.
        """
        rows = np.ascontiguousarray(rows, dtype=self.fmt.dtype)
        _check_finite(rows)
        amax = np.max(np.abs(rows), axis=1)
        nz = np.flatnonzero(amax > 0)
        if nz.size == 0:
            return
        row_slots = np.asarray(row_slots, np.int64)
        self._raise_windows(j, row_slots[nz], self.fmt.top_exponent(amax[nz]))
        e = self.e_top[j, row_slots]
        live = e != EMPTY_E
        esafe = np.where(live, e, 0)
        units = deposit_units(
            self.fmt, self.L, rows.ravel(), np.repeat(esafe, rows.shape[1])
        ).reshape(self.L, rows.shape[0], rows.shape[1])
        self.dev[j][:, row_slots] += units.sum(axis=2)
        self._note_adds(rows.size)

    def _note_adds(self, n: int) -> None:
        # int64 deviations hold >= 2**22 worst-case contributions between
        # renormalisations (2**22 * 2**(W-1) < 2**62 for double).
        self._since_renorm += n
        if self._since_renorm > (1 << 22):
            self.renorm_all()

    def renorm_all(self) -> None:
        for j in range(self.ncols):
            renorm(self.dev[j], self.C[j], self.fmt)
        self._since_renorm = 0

    # ---------------------------------------------------------------- merge
    def merge_state_rows(self, keys, e_tops, devs, Cs, j: int = 0) -> None:
        """Merge exported state rows (possibly several per key) into column j.

        ``e_tops (k,)``, ``devs``/``Cs`` ``(k, L)`` int64 — the layout
        produced by :meth:`export_states` / the Spark codec. Rows with
        ``EMPTY_E`` are identity elements and are skipped.
        """
        e_tops = np.asarray(e_tops, np.int64)
        devs = np.asarray(devs, np.int64).reshape(-1, self.L)
        Cs = np.asarray(Cs, np.int64).reshape(-1, self.L)
        liverow = e_tops != EMPTY_E
        if not np.any(liverow):
            # still materialise the keys so they appear in the output
            self.slots_for(np.asarray(keys))
            return
        slots = self.slots_for(np.asarray(keys))
        slots, e_tops, devs, Cs = (
            slots[liverow], e_tops[liverow], devs[liverow], Cs[liverow]
        )
        # target window per touched slot = max(own, all incoming rows)
        tgt = np.full(self.n_slots, EMPTY_E, np.int64)
        np.maximum.at(tgt, slots, e_tops)
        idx = np.flatnonzero(tgt != EMPTY_E)
        self._raise_windows(j, idx, tgt[idx])
        s = (self.e_top[j, slots] - e_tops) // self.fmt.W
        for sv in np.unique(s):
            sel = np.flatnonzero(s == sv)
            if sv >= self.L:
                continue
            for lev in range(self.L - sv):
                np.add.at(self.dev[j, lev + sv], slots[sel], devs[sel, lev])
                np.add.at(self.C[j, lev + sv], slots[sel], Cs[sel, lev])
        # canonical incoming rows carry < 2**(m-2) units each — 2**11 times
        # a single deposit's bound — so weight them accordingly against the
        # lazy-renorm budget; headroom stays within int64 (tested).
        self._note_adds(slots.size << 11)

    def adopt_strided(self, other: "GroupedBinnedAcc", base: int,
                      stride: int) -> None:
        """Adopt ``other``'s slots at positions ``base + i*stride``.

        The transfer phase of PARTITIONANDAGGREGATE: partition ``base``'s
        private table holds *disjoint* groups (global key = local*stride
        + base), so its states can be copied — no summation needed. Both
        accumulators must be dense; the target slots must be EMPTY.
        """
        if not (self._dense and other._dense):
            raise TypeError("adopt_strided requires dense accumulators")
        other.renorm_all()
        n = min(other.n_slots, (self.n_slots - base + stride - 1) // stride)
        sl = slice(base, base + n * stride, stride)
        if np.any(self.e_top[:, sl] != EMPTY_E):
            raise ValueError("adopt_strided target slots must be empty")
        self.e_top[:, sl] = other.e_top[:, :n]
        self.dev[:, :, sl] = other.dev[:, :, :n]
        self.C[:, :, sl] = other.C[:, :, :n]
        self._win_dirty = [True] * self.ncols  # lazy: O(n_slots) scan

    def merge(self, other: "GroupedBinnedAcc") -> "GroupedBinnedAcc":
        if other.fmt is not self.fmt or other.L != self.L or other.ncols != self.ncols:
            raise TypeError("incompatible accumulators")
        other.renorm_all()
        okeys = other.keys()
        for j in range(self.ncols):
            self.merge_state_rows(
                okeys, other.e_top[j], other.dev[j].T, other.C[j].T, j=j
            )
        return self

    # ------------------------------------------------------------- export
    def export_states(self, j: int = 0):
        """(keys, e_top, dev (n,L), C (n,L)) — canonical renormalised bits."""
        self.renorm_all()
        return (
            self.keys(),
            self.e_top[j].copy(),
            self.dev[j].T.copy(),
            self.C[j].T.copy(),
        )

    def finalize(self) -> np.ndarray:
        """Per-slot rounded sums, shape (n_slots, ncols) in the format dtype."""
        self.renorm_all()
        out = np.empty((self.n_slots, self.ncols), self.fmt.dtype)
        for j in range(self.ncols):
            out[:, j] = finalize_state(
                self.fmt, self.L, self.e_top[j], self.dev[j], self.C[j]
            )
        return out
