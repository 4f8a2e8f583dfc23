"""Relational data model shared by the Spark layer and the ILP engine.

The paper runs DLearn against a main-memory RDBMS (VoltDB). We mirror
that split: every set-oriented transformation (generation, similarity
join, CFD detection/injection/repair, unification) is a Spark DataFrame
pipeline, and the per-example inner loop (bottom clauses, θ-subsumption)
runs against an immutable, indexed, broadcastable :class:`LocalDB`
snapshot collected from those DataFrames.

**Domains** implement Castor-style schema-driven joinability:

* a ``var`` domain is variabilised in clauses and exact-joinable against
  any attribute with the *same* domain tag (ids, titles, names, years);
* a ``const`` domain keeps its values as constants in clauses (genres,
  rating symbols, categories, months) — these carry class signal and are
  never join paths.

Castor-NoMD gives the two databases disjoint domain tags for MD
attributes so no cross-database join exists; Castor-Exact merges each
MD's two domains (exact joins); DLearn keeps them disjoint and bridges
them with similarity literals.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame


@dataclass(frozen=True)
class Attribute:
    """Attribute with a joinability domain tag and a kind.

    ``search=False`` keeps the attribute joinable (same-domain values
    still variabilise to the same variable) but excludes it from
    Algorithm 2's exact-search expansion — Castor-style schema-driven
    join paths: a year value is a join *target*, not a tuple-gathering
    path (searching by year would flood the per-relation sample budget
    with unrelated tuples).
    """

    name: str
    domain: str
    kind: str = "var"  # "var" | "const"
    search: bool = True


@dataclass(frozen=True)
class Relation:
    """Relation schema: name + ordered attributes."""

    name: str
    attrs: tuple[Attribute, ...]

    def attr_index(self, name: str) -> int:
        for i, a in enumerate(self.attrs):
            if a.name == name:
                return i
        raise KeyError(f"{self.name} has no attribute {name}")


@dataclass
class LocalDB:
    """Immutable in-memory snapshot of the database.

    ``tuples[rel]`` is a list of value tuples; ``index[rel][attr_idx]``
    maps value → tuple positions for O(1) exact selection (the SQL
    selection queries of Algorithm 2).
    """

    relations: dict[str, Relation]
    tuples: dict[str, list[tuple]]
    index: dict[str, dict[int, dict[object, list[int]]]] = field(
        default_factory=dict
    )

    def __post_init__(self) -> None:
        if not self.index:
            for rel, rows in self.tuples.items():
                per_attr: dict[int, dict[object, list[int]]] = {}
                n_attrs = len(self.relations[rel].attrs)
                for j in range(n_attrs):
                    col: dict[object, list[int]] = {}
                    for i, row in enumerate(rows):
                        col.setdefault(row[j], []).append(i)
                    per_attr[j] = col
                self.index[rel] = per_attr

    def lookup(self, rel: str, attr_idx: int, value: object) -> list[int]:
        return self.index.get(rel, {}).get(attr_idx, {}).get(value, [])

    def n_tuples(self) -> int:
        return sum(len(v) for v in self.tuples.values())


def local_db_from_spark(
    relations: dict[str, Relation], frames: dict[str, DataFrame | pd.DataFrame]
) -> LocalDB:
    """Collect Spark (or pandas) frames into a :class:`LocalDB`.

    Column order must match the relation's attribute order; values are
    taken as-is (strings/ints).
    """
    tuples: dict[str, list[tuple]] = {}
    for name, rel in relations.items():
        df = frames[name]
        pdf = df.toPandas() if isinstance(df, DataFrame) else df
        cols = [a.name for a in rel.attrs]
        missing = set(cols) - set(pdf.columns)
        if missing:
            raise ValueError(f"{name}: missing columns {sorted(missing)}")
        # tolist() yields native Python values (str/int/float), keeping
        # Const equality and index hashing free of numpy scalar types.
        columns = [pdf[c].tolist() for c in cols]
        tuples[name] = list(zip(*columns)) if columns else []
    return LocalDB(relations=relations, tuples=tuples)


@dataclass(frozen=True)
class TargetRelation:
    """The relation being learned: name + typed attributes."""

    name: str
    attrs: tuple[Attribute, ...]
