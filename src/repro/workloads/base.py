"""Common workload container.

A workload bundles the fragmented input relation (a Spark DataFrame
with a ``frag`` column), the algebraic aggregate to run over it, and
the DuckDB SQL that defines the correct answer (over a table named
``r`` — the raw input including the ``frag`` column, which the SQL
simply ignores).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import Column, DataFrame

from repro.engine.aggspec import AggSpec


@dataclass
class Workload:
    name: str
    df: DataFrame
    spec: AggSpec
    sql: str
    n_frags: int
    tuple_bytes: float = 16.0
    #: Optional custom key->partition expression (skewed repartition
    #: functions, Section 5.2.3); consumed by ``make_state``.
    partitioner: Column | None = field(default=None, repr=False)

    def oracle_tables(self) -> dict[str, pd.DataFrame]:
        """Input table(s) for ``repro.oracle.assert_equivalent``."""
        return {"r": self.df.toPandas()}
