"""Dataset container shared by the three synthetic corpora."""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from repro.cfd.cfdtypes import CFD
from repro.core.dbmodel import Relation, TargetRelation
from repro.md.mdtypes import MD


@dataclass
class DirtyDataset:
    """A dirty two-database corpus plus its constraints and examples.

    ``frames`` are Spark DataFrames, one per relation (column order =
    attribute order). ``exact_domain_map`` merges the domain tags of
    each MD's attribute pair — applying it makes those attributes
    exact-joinable (the Castor-Exact ablation and the post-cleaning
    join of Castor-Clean).
    """

    name: str
    relations: dict[str, Relation]
    frames: dict[str, DataFrame]
    mds: list[MD]
    cfds: list[CFD]
    target: TargetRelation
    pos: list[tuple]
    neg: list[tuple]
    exact_domain_map: dict[str, str] = field(default_factory=dict)
    meta: dict = field(default_factory=dict)

    def n_tuples(self) -> int:
        return sum(df.count() for df in self.frames.values())
