"""Workload registry: the paper's five benchmarks as real Spark SQL.

Each :class:`Query` is a single SQL string executed verbatim by Spark SQL
(over temp views) *and* by the DuckDB oracle (over the same pandas
frames), so result equality is checked query-for-query. Each query
carries its Pavlo category ('selection' / 'join' / 'aggregation',
Section 5.11) — the same taxonomy the simulator profiles use.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from pyspark.sql import DataFrame, SparkSession

__all__ = ["Query", "Benchmark", "register_views", "all_benchmarks"]


@dataclass(frozen=True)
class Query:
    name: str
    category: str  # 'selection' | 'join' | 'aggregation'
    sql: str

    def __post_init__(self) -> None:
        if self.category not in ("selection", "join", "aggregation"):
            raise ValueError(f"bad category for {self.name}")


@dataclass(frozen=True)
class Benchmark:
    """A named Spark SQL application: tables plus an ordered query list."""

    name: str
    make_tables: Callable[[SparkSession, float], dict[str, DataFrame]]
    queries: tuple[Query, ...]

    def query(self, name: str) -> Query:
        for q in self.queries:
            if q.name == name:
                return q
        raise KeyError(name)

    @property
    def query_names(self) -> list[str]:
        return [q.name for q in self.queries]


def register_views(spark: SparkSession, tables: dict[str, DataFrame]) -> None:
    """Register each table as a temp view so queries run via spark.sql."""
    for name, df in tables.items():
        df.createOrReplaceTempView(name)


def all_benchmarks() -> dict[str, Benchmark]:
    """The five benchmarks of Table 1 (TPC-H-lite, TPC-DS-lite, HiBench)."""
    from repro.workloads.hibench import HIBENCH_BENCHMARKS
    from repro.workloads.tpcds import TPCDS_LITE
    from repro.workloads.tpch import TPCH_LITE

    out = {"TPC-H": TPCH_LITE, "TPC-DS": TPCDS_LITE}
    out.update(HIBENCH_BENCHMARKS)
    return out
