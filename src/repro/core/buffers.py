"""Summation buffers (paper Section V-A).

A *summation buffer* augments each group's reproducible state with a
``bsz``-slot array of raw input values plus a fill offset. Appending a
value costs one store; only when a buffer fills is it flushed through
the vectorized summation kernel (``GroupedBinnedAcc.deposit_rows``),
amortising the per-call costs of RSUM. The intermediate-aggregate
layout of Figure 5 is realised here as one ``(n_groups, bsz)`` value
matrix plus an offset vector, on top of a :class:`GroupedBinnedAcc`.
"""
from __future__ import annotations

import numpy as np

from .binned import GroupedBinnedAcc

__all__ = ["BufferedGroupedAcc"]


class BufferedGroupedAcc:
    """GROUPBY accumulator with per-group summation buffers.

    Same interface shape as :class:`GroupedBinnedAcc` (dense or keyed),
    but values are buffered and flushed in bulk. ``finalize``/export
    flush all partial buffers first, so results are bit-identical to the
    unbuffered accumulator for any ``bsz`` (tested).
    """

    def __init__(self, *, L: int = 2, dtype=np.float64, ncols: int = 1,
                 bsz: int = 256, dense_n_groups: int | None = None):
        if bsz < 1:
            raise ValueError("bsz must be >= 1")
        self.acc = GroupedBinnedAcc(
            L=L, dtype=dtype, ncols=ncols, dense_n_groups=dense_n_groups
        )
        self.bsz = bsz
        n0 = dense_n_groups or 0
        self.buf = np.zeros((ncols, n0, bsz), self.acc.fmt.dtype)
        self.off = np.zeros(n0, np.int64)

    @property
    def ncols(self) -> int:
        return self.acc.ncols

    def _sync_capacity(self) -> None:
        add = self.acc.n_slots - self.off.size
        if add > 0:
            self.buf = np.concatenate(
                [self.buf, np.zeros((self.ncols, add, self.bsz), self.acc.fmt.dtype)],
                axis=1,
            )
            self.off = np.concatenate([self.off, np.zeros(add, np.int64)])

    def update(self, keys, values) -> "BufferedGroupedAcc":
        vals = np.asarray(values)
        if vals.ndim == 1:
            vals = vals[:, None]
        slots = self.acc.slots_for(np.asarray(keys))
        self._sync_capacity()
        self.update_slots(slots, vals)
        return self

    def update_slots(self, slots: np.ndarray, vals: np.ndarray) -> None:
        """Append a batch into the buffers, flushing groups as they fill.

        One stable sort per batch yields each element's rank within its
        group, from which buffer positions follow; elements that overrun
        a buffer trigger a flush of that buffer row and are retried
        (at most ``ceil(max_run / bsz)`` passes).
        """
        if vals.ndim == 1:
            vals = vals[:, None]
        vals = np.ascontiguousarray(vals, dtype=self.acc.fmt.dtype)
        order = np.argsort(slots, kind="stable")
        ss = slots[order]
        vs = vals[order]
        # rank of each element within its group-run
        starts = np.flatnonzero(np.r_[True, ss[1:] != ss[:-1]])
        run_id = np.cumsum(np.r_[True, ss[1:] != ss[:-1]]) - 1
        rank = np.arange(ss.size) - starts[run_id]
        while ss.size:
            pos = self.off[ss] + rank
            fits = pos < self.bsz
            put = np.flatnonzero(fits)
            if put.size:
                flat = ss[put] * self.bsz + pos[put]
                for j in range(self.ncols):
                    self.buf[j].reshape(-1)[flat] = vs[put, j]
                # new offsets: one pass of bincount over elements placed
                np.add.at(self.off, ss[put], 1)
            # flush exactly-full buffers among touched groups
            touched = np.unique(ss)
            full = touched[self.off[touched] == self.bsz]
            if full.size:
                self._flush_rows(full)
            remaining = np.flatnonzero(~fits)
            if remaining.size == 0:
                break
            if full.size == 0:  # cannot make progress: bsz overrun w/o flush
                raise AssertionError("buffer scheduling invariant violated")
            ss = ss[remaining]
            vs = vs[remaining]
            # A group with leftover elements was filled to exactly bsz and
            # flushed above (off back to 0), and per-group ranks were
            # consecutive — so the leftovers' new ranks are pos - bsz.
            rank = pos[remaining] - self.bsz

    def _flush_rows(self, rows: np.ndarray) -> None:
        for j in range(self.ncols):
            self.acc.deposit_rows(j, rows, self.buf[j, rows])
            self.buf[j, rows] = 0
        self.off[rows] = 0

    def flush_all(self) -> None:
        rows = np.flatnonzero(self.off > 0)
        if rows.size:
            self._flush_rows(rows)

    def merge(self, other) -> "BufferedGroupedAcc":
        self.flush_all()
        if isinstance(other, BufferedGroupedAcc):
            other.flush_all()
            self.acc.merge(other.acc)
        else:
            self.acc.merge(other)
        self._sync_capacity()
        return self

    def export_states(self, j: int = 0):
        self.flush_all()
        return self.acc.export_states(j)

    def keys(self) -> np.ndarray:
        return self.acc.keys()

    def finalize(self) -> np.ndarray:
        self.flush_all()
        return self.acc.finalize()
