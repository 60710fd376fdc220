"""Shared pieces of the QaaS baseline models (paper §5.4)."""
from __future__ import annotations

import dataclasses

import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclasses.dataclass(frozen=True)
class QaaSEstimate:
    """Paper-scale latency/price of one query on one system."""

    system: str
    query: str
    latency_s: float
    cost_usd: float
    billed_bytes: float
    load_s: float = 0.0  # ETL time (BigQuery's cold path)

    @property
    def cold_latency_s(self) -> float:
        return self.latency_s + self.load_s


def run_sql(spark: SparkSession, sql: str, **tables: pd.DataFrame) -> DataFrame:
    """Execute ``sql`` on Spark SQL (Catalyst) over pandas inputs — the
    QaaS engines' *result* semantics, checked against the DuckDB oracle.

    DuckDB-flavoured ``TIMESTAMP '...'`` literals are valid Spark SQL too.
    """
    for name, pdf in tables.items():
        spark.createDataFrame(pdf).createOrReplaceTempView(name)
    return spark.sql(sql)
