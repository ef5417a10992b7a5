"""Reproducible GROUPBY SUM for Spark DataFrames.

This is the paper's algorithm (Sections IV/V) installed as a custom
physical aggregation operator in Spark, per the repro plan: an
*associative* reproducible numeric type (the binned state of
``repro.core.binned``) with *vectorized batch summation* over Arrow
record batches.

Pipeline shape (mirrors Spark's own partial-aggregate → shuffle → final
merge):

1. ``mapInPandas`` — within each input partition, every Arrow batch is
   grouped and deposited through the vectorized kernel into per-group
   binned states (with summation buffers by default: the buffered
   accumulator of Section V; ``buffered=False`` gives the per-element
   drop-in path of Section IV). One state row per (group, partition) is
   emitted.
2. ``groupBy(keys).applyInPandas`` — partial states of a group meet
   after the shuffle in arbitrary order; because the state is
   associative and its per-level sums are exact, the merge result is
   bit-identical for any order/partitioning.
3. Finalisation rounds each group's state to one float.

A single-phase grouped-aggregate pandas UDAF (:func:`repro_sum_udf`) is
also provided for direct use in ``df.groupBy(...).agg(...)``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..core.binned import BinnedSum, GroupedBinnedAcc
from ..core.params import fmt_for

__all__ = ["rsum_groupby", "repro_sum_udf"]


def _as_list(x) -> list[str]:
    return [x] if isinstance(x, str) else list(x)


def _sum_field(vc: str, dtype) -> T.StructField:
    t = T.FloatType() if np.dtype(dtype) == np.float32 else T.DoubleType()
    return T.StructField(f"{vc}_rsum", t)


def rsum_groupby(
    df: DataFrame,
    keys,
    values,
    *,
    L: int = 2,
    dtype="float64",
    buffered: bool = True,
    bsz: int = 4096,
) -> DataFrame:
    """Reproducible per-group sums of ``values`` grouped by ``keys``.

    Returns a DataFrame with the key columns plus one ``<v>_rsum``
    column per value column. The result is a pure function of the input
    *multiset*: repartitioning, reordering, or changing
    ``spark.sql.shuffle.partitions`` does not change a single bit
    (asserted in tests). ``L`` controls accuracy as in the paper
    (L=2 ≈ IEEE accuracy, L=3 far beyond it).
    """
    keycols, valcols = _as_list(keys), _as_list(values)
    fmt = fmt_for(np.float32 if str(dtype) in ("float32", "float") else np.float64)
    npdtype = fmt.dtype.type
    ncols = len(valcols)

    key_fields = [df.schema[k] for k in keycols]
    state_fields = list(key_fields)
    for vc in valcols:
        state_fields += [
            T.StructField(f"{vc}__e", T.LongType()),
            T.StructField(f"{vc}__dev", T.ArrayType(T.LongType())),
            T.StructField(f"{vc}__C", T.ArrayType(T.LongType())),
        ]
    state_schema = T.StructType(state_fields)
    out_schema = T.StructType(list(key_fields) + [_sum_field(v, npdtype) for v in valcols])

    def partial(batches):
        """Per-partition partial aggregation with vectorized deposits."""
        acc = GroupedBinnedAcc(L=L, dtype=npdtype, ncols=ncols)
        if buffered:
            # Arrow batches play the summation-buffer role; bsz bounds the
            # vectorized deposit chunk (see binned.py FAST_CHUNK).
            acc.FAST_CHUNK = max(16, int(bsz)) if bsz else None
        index: dict[tuple, int] = {}
        rows: list[tuple] = []
        for pdf in batches:
            if len(pdf) == 0:
                continue
            codes_local = pdf.groupby(keycols, sort=False, dropna=False).ngroup().to_numpy()
            first = np.unique(codes_local, return_index=True)[1]
            ktups = [
                tuple(r)
                for r in pdf.iloc[first][keycols].itertuples(index=False, name=None)
            ]
            gcodes = np.empty(len(ktups), np.int64)
            for i, t in enumerate(ktups):
                code = index.get(t)
                if code is None:
                    code = len(index)
                    index[t] = code
                    rows.append(t)
                gcodes[i] = code
            vals = pdf[valcols].to_numpy(np.float64, na_value=np.nan)
            # SQL SUM ignores NULLs; for summation NULL->0 is equivalent.
            # Documented deviation: an all-NULL group yields 0.0, not NULL.
            nan = np.isnan(vals)
            if nan.any():
                vals = np.where(nan, 0.0, vals)
            acc.update(gcodes[codes_local], vals, fast=buffered)
        if not rows:
            return
        out = {}
        codes = np.asarray(acc.keys(), np.int64)  # slot order == code order
        for i, kc in enumerate(keycols):
            out[kc] = pd.Series([rows[c][i] for c in codes])
        for j, vc in enumerate(valcols):
            _, e, dev, C = acc.export_states(j)
            out[f"{vc}__e"] = e
            out[f"{vc}__dev"] = list(dev)
            out[f"{vc}__C"] = list(C)
        yield pd.DataFrame(out)

    def merge(pdf: pd.DataFrame) -> pd.DataFrame:
        """Associative merge of one group's partial states + finalisation."""
        res = {kc: [pdf[kc].iloc[0]] for kc in keycols}
        for vc in valcols:
            macc = GroupedBinnedAcc(L=L, dtype=npdtype, dense_n_groups=1)
            macc.merge_state_rows(
                np.zeros(len(pdf), np.int64),
                pdf[f"{vc}__e"].to_numpy(np.int64),
                np.array(pdf[f"{vc}__dev"].tolist(), np.int64),
                np.array(pdf[f"{vc}__C"].tolist(), np.int64),
            )
            res[f"{vc}_rsum"] = np.asarray([macc.finalize()[0, 0]], npdtype)
        return pd.DataFrame(res)

    partials = df.select(*keycols, *valcols).mapInPandas(partial, state_schema)
    return partials.groupBy(*keycols).applyInPandas(merge, out_schema)


def pandas_sum_groupby(df: DataFrame, keys, values) -> DataFrame:
    """Plain (non-reproducible) double SUM through the *same* pipeline.

    The Table IV baseline: the paper swaps the aggregation operator
    inside MonetDB, keeping scan/decompression identical. The analogous
    in-place swap here keeps the mapInPandas partial → shuffle →
    final-merge pipeline and only replaces the reproducible state with
    ordinary float64 accumulation — so comparing against it isolates the
    cost of reproducibility, not the Python/JVM boundary. Columns are
    named ``<v>_rsum`` to be drop-in comparable.
    """
    keycols, valcols = _as_list(keys), _as_list(values)
    key_fields = [df.schema[k] for k in keycols]
    schema = T.StructType(
        list(key_fields) + [T.StructField(f"{v}_rsum", T.DoubleType())
                            for v in valcols]
    )

    def partial(batches):
        # built-in-operator cost profile: one scatter-add per element per
        # column into a dense table (the paper's float baseline)
        index: dict[tuple, int] = {}
        rows: list[tuple] = []
        table = np.zeros((0, len(valcols)))
        for pdf in batches:
            if len(pdf) == 0:
                continue
            codes_local = pdf.groupby(
                keycols, sort=False, dropna=False
            ).ngroup().to_numpy()
            first = np.unique(codes_local, return_index=True)[1]
            ktups = [
                tuple(r)
                for r in pdf.iloc[first][keycols].itertuples(index=False, name=None)
            ]
            gcodes = np.empty(len(ktups), np.int64)
            for i, kt in enumerate(ktups):
                code = index.get(kt)
                if code is None:
                    code = len(index)
                    index[kt] = code
                    rows.append(kt)
                gcodes[i] = code
            if len(index) > table.shape[0]:
                table = np.vstack(
                    [table, np.zeros((len(index) - table.shape[0], len(valcols)))]
                )
            slots = gcodes[codes_local]
            vals = pdf[valcols].to_numpy(np.float64, na_value=0.0)
            for jcol in range(len(valcols)):
                np.add.at(table[:, jcol], slots, vals[:, jcol])
        if rows:
            out = {kc: [r[i] for r in rows] for i, kc in enumerate(keycols)}
            for jcol, vc in enumerate(valcols):
                out[f"{vc}_rsum"] = table[: len(rows), jcol]
            yield pd.DataFrame(out)

    partials = df.select(*keycols, *valcols).mapInPandas(partial, schema)
    return partials.groupBy(*keycols).agg(
        *[F.sum(f"{v}_rsum").alias(f"{v}_rsum") for v in valcols]
    )


def repro_sum_udf(L: int = 2, dtype="float64"):
    """Single-phase reproducible SUM as a grouped-agg pandas UDAF.

    Usage: ``df.groupBy("k").agg(repro_sum_udf(L=2)(F.col("v")).alias("s"))``.
    Spark gathers each group's values into one pandas Series (no partial
    aggregation); the vectorized binned kernel makes the result
    independent of the gather order. Suited to moderate group sizes —
    for very large groups prefer :func:`rsum_groupby`, which aggregates
    partials per partition.
    """
    npdtype = np.float32 if str(dtype) in ("float32", "float") else np.float64
    ret = "float" if npdtype is np.float32 else "double"

    @F.pandas_udf(ret)
    def repro_sum(v: pd.Series) -> float:
        arr = v.to_numpy(np.float64, na_value=np.nan)
        return BinnedSum(L=L, dtype=npdtype).add_vector(
            arr[~np.isnan(arr)]  # SQL SUM ignores NULLs
        ).finalize()

    return repro_sum
