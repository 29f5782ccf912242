"""MICE Algorithm 2 — computation sharing for low missing rates.

One global cofactor Triple ``C`` is computed over the initially-imputed data
once, outside the loop (excluding the all-missing partition, which belongs
to no training set). Per attribute the training cofactor is derived by ring
subtraction, ``C_train = C − ΔC``, where ``ΔC`` scans only the two small
partitions holding rows with that attribute missing (its single-missing
subpartition plus the ≥2-missing overflow). After imputing, ``C`` is
restored incrementally: ``C = C_train + ΔC'`` with ``ΔC'`` over the freshly
imputed rows — the expensive full-data scan never recurs.

Partition membership is fixed (masks never change), so empty partitions are
skipped without issuing Spark jobs, and each ΔC is a single unioned scan.
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.ring import cofactor_ring
from repro.ring.schema import AttrSchema
from repro.ring.triple import Triple
from .baseline import MiceResult
from .partition import Partitions, partition
from .prep import mask_col, prepare
from .step import apply_imputation, attr_seed, fit
from .timing import TimingLog


def _union(dfs: list[DataFrame]) -> DataFrame | None:
    return reduce(DataFrame.unionByName, dfs) if dfs else None


def _delta_cofactor(parts: Partitions, attr: str, schema: AttrSchema) -> Triple:
    """ΔC over the rows with ``attr`` missing, in one Spark job (Alg. 2 l. 5/9)."""
    pieces = []
    if parts.count_of(attr) != 0:
        pieces.append(parts.single[attr])
    if parts.count_of("overflow") != 0:
        pieces.append(parts.overflow.filter(F.col(mask_col(attr))))
    df = _union([p.select(*schema.names) for p in pieces])
    return cofactor_ring(df, schema) if df is not None else Triple.zero(schema)


def mice_low(
    df: DataFrame,
    schema: AttrSchema,
    incomplete: list[str],
    *,
    iters: int = 1,
    noise: bool = True,
    seed: int = 0,
    l2: float = 1e-3,
    timing: TimingLog | None = None,
) -> MiceResult:
    """Run Algorithm 2 with the low-missing-rate partitioning."""
    timing = timing or TimingLog()
    with timing.time("preprocess.prepare"):
        prep = prepare(df, schema, incomplete)
    with timing.time("preprocess.partition"):
        parts = partition(prep, mode="low")
    with timing.time("preprocess.global_cofactor"):
        # C over everything that can appear in a training set (Alg. 2 line 2);
        # the all-missing partition is excluded (never trained on). One job.
        pieces = [
            p
            for p, c in (
                (parts.complete, parts.count_of("complete")),
                (parts.overflow, parts.count_of("overflow")),
                *[(parts.single[a], parts.count_of(a)) for a in incomplete],
            )
            if c != 0
        ]
        union = _union([p.select(*schema.names) for p in pieces])
        c_global = (
            cofactor_ring(union, schema) if union is not None
            else Triple.zero(schema)
        )

    for it in range(iters):
        for ai, attr in enumerate(incomplete):
            with timing.time("iter.delta_cofactor"):
                delta = _delta_cofactor(parts, attr, schema)
            c_train = (c_global - delta).prune(tol=0.0)
            with timing.time("iter.train"):
                model = fit(c_train, attr, prep, l2=l2)
            if model is None:
                continue
            s = attr_seed(seed, it, ai)
            with timing.time("iter.update"):
                # single[attr] is fully recreated; overflow and the
                # all-missing partition are touched only on masked rows.
                if parts.count_of(attr) != 0:
                    parts.single[attr] = apply_imputation(
                        parts.single[attr], model, attr, prep, s, noise
                    )
                if parts.count_of("overflow") != 0:
                    parts.overflow = apply_imputation(
                        parts.overflow, model, attr, prep, s + 1, noise
                    )
                if parts.count_of("none") != 0:
                    parts.none = apply_imputation(
                        parts.none, model, attr, prep, s + 2, noise
                    )
            with timing.time("iter.delta_cofactor"):
                d2 = _delta_cofactor(parts, attr, schema)
            c_global = c_train + d2

    return MiceResult(df=parts.union_all(), timing=timing, prep=prep)
