"""Lambada driver and execution engine (paper §3, Fig 3).

The driver compiles the plan, assigns input files to serverless workers,
"invokes" them (one Spark task per worker via ``DataFrame.mapInPandas``, the
reproduction's function-per-fragment scheduler), and collects results through
shared storage only: workers post partial rows back as task output and their
success/error message + metrics into a result queue (the ``qresults`` bucket,
standing in for SQS). The driver-scope final aggregation runs as Spark SQL on
the session (Catalyst), mirroring the paper's small driver scopes.

Real wall-clock at SF<=0.1 validates *correctness*; paper-scale latency and
cost come from ``repro.sim.worker_model`` fed with the measured metrics.
"""
from __future__ import annotations

import dataclasses
import json
import math
import uuid
from pathlib import Path

import pandas as pd
import pyarrow as pa
import pyarrow.parquet as pq
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..s3.store import S3Client, S3Store
from ..scan.s3file import S3RandomAccessFile
from . import compile as qc
from . import frontend, plan as pl
from .metrics import QueryMetrics, WorkerMetrics
from .worker import execute_fragment

RESULT_BUCKET = "qresults"


class WorkerError(RuntimeError):
    """At least one worker posted an error message to the result queue."""


@dataclasses.dataclass
class QueryResult:
    """Result of one Lambada query execution."""

    spark_df: DataFrame  # final (driver-scope) result as a Spark DataFrame
    result: pd.DataFrame  # the same, collected
    metrics: QueryMetrics
    n_workers: int
    files_per_worker: int


def _spark_type(t: pa.DataType) -> T.DataType:
    if pa.types.is_string(t) or pa.types.is_large_string(t):
        return T.StringType()
    if pa.types.is_timestamp(t):
        return T.TimestampType()
    if pa.types.is_date(t):
        return T.DateType()
    if pa.types.is_integer(t):
        return T.LongType()
    if pa.types.is_floating(t):
        return T.DoubleType()
    if pa.types.is_boolean(t):
        return T.BooleanType()
    raise TypeError(f"unsupported column type {t}")


def _arrow_schema(store_root: str, f) -> pa.Schema:
    """Driver-scope pre-processing: one footer read of the first file."""
    client = S3Client(store_root)
    fobj = S3RandomAccessFile(client, f[0], f[1])
    schema = pq.ParquetFile(fobj).schema_arrow
    fobj.close()
    return schema


def _partial_spark_schema(phys: qc.PhysicalQuery, arrow: pa.Schema) -> T.StructType:
    fields = []
    if phys.aggs:
        for c in phys.partial_schema():
            if c.kind == "key":
                fields.append(T.StructField(c.name, _spark_type(arrow.field(c.name).type)))
            elif c.kind == "count":
                fields.append(T.StructField(c.name, T.LongType()))
            else:
                fields.append(T.StructField(c.name, T.DoubleType()))
    else:
        names = phys.scan_columns or [f.name for f in arrow]
        if phys.projections is not None:
            for name in phys.projections:
                fields.append(T.StructField(name, T.DoubleType()))
            names = [k for k in phys.keys if k not in phys.projections]
        for name in names:
            fields.append(T.StructField(name, _spark_type(arrow.field(name).type)))
    return T.StructType(fields)


def _final_aggregation(partials: DataFrame, phys: qc.PhysicalQuery) -> DataFrame:
    """Driver scope: combine partial states with Spark SQL (Catalyst)."""
    if not phys.aggs:
        return partials
    combined = []
    for a in phys.aggs:
        if a.fn == "sum":
            combined.append(F.sum(a.out_name).alias(a.out_name))
        elif a.fn == "count":
            combined.append(F.sum(a.out_name).cast("long").alias(a.out_name))
        elif a.fn == "avg":
            combined.append(
                (F.sum(a.out_name + "__sum") / F.sum(a.out_name + "__cnt")).alias(a.out_name)
            )
        elif a.fn == "min":
            combined.append(F.min(a.out_name).alias(a.out_name))
        elif a.fn == "max":
            combined.append(F.max(a.out_name).alias(a.out_name))
    if phys.keys:
        return partials.groupBy(*phys.keys).agg(*combined)
    return partials.agg(*combined)


def run_query(
    spark: SparkSession,
    store_root: str,
    query,
    *,
    n_workers: int | None = None,
    files_per_worker: int | None = None,
    chunk_bytes: int = 1 << 20,
    footer_hint: int = 1 << 16,
    memory_limit_mib: int | None = None,
    run_id: str | None = None,
) -> QueryResult:
    """Execute a Lambada plan with ``n_workers`` serverless workers.

    ``query`` may be a frontend :class:`Dataset`, a logical plan, or an
    already-compiled :class:`PhysicalQuery`. Exactly one of ``n_workers`` /
    ``files_per_worker`` may be given; the default is one worker per file
    (the paper's F=1).
    """
    if isinstance(query, frontend.Dataset):
        query = query.plan
    phys = query if isinstance(query, qc.PhysicalQuery) else qc.compile_plan(query)
    n_files = len(phys.files)
    if n_workers is not None and files_per_worker is not None:
        raise ValueError("give n_workers or files_per_worker, not both")
    if n_workers is None:
        fpw = files_per_worker or 1
        n_workers = math.ceil(n_files / fpw)
    n_workers = min(n_workers, n_files)
    run_id = run_id or uuid.uuid4().hex[:12]

    S3Store(store_root).create_bucket(RESULT_BUCKET)
    arrow = _arrow_schema(store_root, phys.files[0])
    out_schema = _partial_spark_schema(phys, arrow)
    out_cols = [f.name for f in out_schema.fields]

    assignments = [
        (w, json.dumps(phys.files[w::n_workers])) for w in range(n_workers)
    ]
    tasks = spark.createDataFrame(assignments, schema="worker int, files string")
    # one Spark task per serverless worker (the FaaS scheduler analogue)
    tasks = tasks.repartition(n_workers, "worker")

    root, limit, chunk, fhint = store_root, memory_limit_mib, chunk_bytes, footer_hint

    def _run_worker(batches):
        for batch in batches:
            for _, row in batch.iterrows():
                wid = int(row["worker"])
                files = [tuple(f) for f in json.loads(row["files"])]
                queue = S3Client(root)  # result-queue client (SQS stand-in)
                try:
                    partial, m = execute_fragment(
                        root,
                        wid,
                        files,
                        phys,
                        chunk_bytes=chunk,
                        footer_hint=fhint,
                        memory_limit_mib=limit,
                    )
                except Exception as e:  # report instead of dying silently
                    msg = WorkerMetrics(worker_id=wid, status="error", error=repr(e))
                    queue.put(RESULT_BUCKET, f"{run_id}/w{wid}.json", msg.to_json().encode())
                    continue
                queue.put(RESULT_BUCKET, f"{run_id}/w{wid}.json", m.to_json().encode())
                for c in out_schema.fields:
                    if c.name not in partial.columns:
                        partial[c.name] = pd.Series(dtype="float64")
                yield partial[out_cols]

    partials = tasks.mapInPandas(_run_worker, schema=out_schema)
    final = _final_aggregation(partials, phys)
    result = final.toPandas()  # the action: runs all workers + driver scope

    # driver polls the result queue until it heard back from all workers
    qdir = Path(store_root) / RESULT_BUCKET / run_id
    reports = sorted(qdir.glob("w*.json"))
    workers = [WorkerMetrics.from_json(p.read_text()) for p in reports]
    missing = set(range(n_workers)) - {w.worker_id for w in workers}
    if missing:
        raise WorkerError(f"workers {sorted(missing)} never reported")
    errors = [w for w in workers if w.status == "error"]
    if errors:
        raise WorkerError(
            "; ".join(f"worker {w.worker_id}: {w.error}" for w in errors)
        )
    workers.sort(key=lambda w: w.worker_id)
    return QueryResult(
        spark_df=final,
        result=result,
        metrics=QueryMetrics(workers),
        n_workers=n_workers,
        files_per_worker=math.ceil(n_files / n_workers),
    )
