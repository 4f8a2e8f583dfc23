"""Minimal CFD repair at the data level (paper §2.3, §6.1.3).

DLearn-Repaired learns over "a version of the database whose CFD
violations are repaired ... using the minimal repair method". For the
key-style CFDs of the experiments, the minimal repair of a violating
LHS group is to unify its RHS values to one of the present values —
which one is unknowable, so we pick deterministically-pseudo-randomly
per group (seeded hash over the candidate values), modelling a repair
tool that cannot know the true value. Duplicate rows produced by the
unification are dropped.

Pure DataFrame pipeline; ``repair_all`` iterates the CFD list to a
fixpoint (a repair of one CFD can induce violations of another).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.cfd.cfdtypes import WILD, CFD
from repro.cfd.violations import satisfies


def minimal_repair(df: DataFrame, cfd: CFD, *, seed: int = 0) -> DataFrame:
    """Unify each violating group's RHS to one seeded-hash-chosen value."""
    in_pattern = None
    for attr, val in cfd.pattern:
        if val != WILD:
            cond = F.col(attr) == F.lit(val)
            in_pattern = cond if in_pattern is None else (in_pattern & cond)
    if in_pattern is None:
        in_pattern = F.lit(True)
    w = Window.partitionBy(
        *[F.when(in_pattern, F.col(c)) for c in cfd.lhs]
    ).orderBy(F.xxhash64(F.col(cfd.rhs), F.lit(seed)))
    repaired_rhs = F.when(
        in_pattern, F.first(F.col(cfd.rhs)).over(w)
    ).otherwise(F.col(cfd.rhs))
    return df.withColumn(cfd.rhs, repaired_rhs).distinct()


def repair_all(
    df_by_rel: dict[str, DataFrame], cfds: list[CFD], *, seed: int = 0, max_iter: int = 4
) -> dict[str, DataFrame]:
    """Repair every relation against its CFDs to a fixpoint."""
    out = dict(df_by_rel)
    for _ in range(max_iter):
        dirty = False
        for cfd in cfds:
            df = out.get(cfd.rel)
            if df is None:
                continue
            if not satisfies(df, cfd):
                out[cfd.rel] = minimal_repair(df, cfd, seed=seed)
                dirty = True
        if not dirty:
            break
    return out
