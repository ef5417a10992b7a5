"""HASHAGGREGATION over a dense identity-hashed table (paper Section IV).

The paper's baseline operator: look up the group's intermediate
aggregate by key and fold the value in. Keys are dense ints in
``[0, n_groups)`` and the hash function is identity (the paper's own
setup: "we use IDENTITYHASHING … not unrealistic in column stores,
where dense ranges are common due to domain encoding"), so the hash
table is a dense array indexed by key. Input is processed in batches of
``batch`` elements to model streaming execution.
"""
from __future__ import annotations

import numpy as np

from .accumulators import make_acc

__all__ = ["hash_aggregate"]


def hash_aggregate(
    keys: np.ndarray,
    values: np.ndarray,
    n_groups: int,
    *,
    kind: str = "builtin",
    batch: int = 1 << 16,
    **acc_kw,
):
    """Aggregate ``values`` by dense ``keys``; returns the accumulator.

    ``kind`` selects the intermediate-aggregate data type (see
    ``accumulators.make_acc``). The returned accumulator exposes
    ``finalize()`` (float64 sums) and ``result_bits()``.
    """
    keys = np.asarray(keys, np.int64)
    values = np.asarray(values)
    if keys.shape != values.shape:
        raise ValueError("keys and values must have the same length")
    acc = make_acc(kind, n_groups, **acc_kw)
    for i in range(0, keys.size, batch):
        acc.update(keys[i : i + batch], values[i : i + batch])
    return acc
