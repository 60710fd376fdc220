"""Serverless worker: executes one plan fragment over its files (paper §3.3).

Mirrors the paper's event handler: it receives a worker ID, the fragment, and
its input file list; runs the execution engine under a memory guard so that
out-of-memory situations are *reported* to the driver instead of the worker
"dying silently"; and posts a success-or-error message (with metrics) to the
result queue.

The fragment pipeline is: S3 Parquet scan (with push-downs) -> residual
filter -> projection -> partial aggregation, all vectorised over Arrow/pandas
batches (the stand-in for the paper's JiT-compiled pipelines).
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd

from ..s3.store import S3Client
from ..scan.parquet_scan import ParquetScanOperator
from . import compile as qc
from .metrics import WorkerMetrics


class WorkerOOM(MemoryError):
    """Fragment would exceed the function's memory limit."""


def _partial_aggregate(df: pd.DataFrame, phys: qc.PhysicalQuery) -> pd.DataFrame:
    """Compute partial aggregation states for one worker's rows."""
    cols = phys.partial_schema()
    state_cols = [c for c in cols if c.kind != "key"]

    def _states(frame: pd.DataFrame) -> dict:
        out = {}
        for a in phys.aggs:
            series = a.expr.eval(frame) if a.expr is not None else None
            if a.fn == "sum":
                out[a.out_name] = series.sum()
            elif a.fn == "count":
                out[a.out_name] = len(frame)
            elif a.fn == "avg":
                out[a.out_name + "__sum"] = series.sum()
                out[a.out_name + "__cnt"] = len(frame)
            elif a.fn == "min":
                out[a.out_name] = series.min()
            elif a.fn == "max":
                out[a.out_name] = series.max()
        return out

    if df.empty:
        return pd.DataFrame(
            {
                c.name: pd.Series(dtype=(object if c.kind == "key" else "float64"))
                for c in cols
            }
        )
    if phys.keys:
        rows = []
        for key_vals, grp in df.groupby(phys.keys, sort=False):
            if len(phys.keys) == 1:
                key_vals = (key_vals,)
            rows.append({**dict(zip(phys.keys, key_vals)), **_states(grp)})
        return pd.DataFrame(rows)
    return pd.DataFrame([_states(df)])


def execute_fragment(
    store_root: str,
    worker_id: int,
    files: list,
    phys: qc.PhysicalQuery,
    *,
    chunk_bytes: int = 1 << 20,
    footer_hint: int = 1 << 16,
    memory_limit_mib: int | None = None,
) -> tuple[pd.DataFrame, WorkerMetrics]:
    """Run the serverless fragment; returns (partial rows, metrics).

    Raises :class:`WorkerOOM` when the scanned data would not fit the
    function's memory budget (the engine runs "with a memory limit slightly
    lower than that of the serverless function").
    """
    t0 = time.monotonic()
    client = S3Client(store_root)
    scan = ParquetScanOperator(
        client,
        files,
        columns=phys.scan_columns or None,
        predicate=phys.scan_predicate,
        chunk_bytes=chunk_bytes,
        footer_hint=footer_hint,
    )
    parts = []
    budget = None if memory_limit_mib is None else int(memory_limit_mib * 0.9) * 2**20
    consumed = 0
    for tbl in scan.tables():
        consumed += tbl.nbytes
        if budget is not None and consumed > budget:
            raise WorkerOOM(
                f"worker {worker_id}: fragment needs >{consumed >> 20} MiB, "
                f"limit {memory_limit_mib} MiB"
            )
        batch = tbl.to_pandas()
        if phys.residual_predicate is not None:
            mask = phys.residual_predicate.eval(batch)
            batch = batch[np.asarray(mask, dtype=bool)]
        if phys.projections is not None:
            out = {name: e.eval(batch) for name, e in phys.projections.items()}
            for k in phys.keys:
                if k not in out:
                    out[k] = batch[k]
            batch = pd.DataFrame(out)
        parts.append(batch)

    if parts:
        rows = pd.concat(parts, ignore_index=True)
    else:  # fully pruned worker: correct empty frame, columns included
        empty = scan.empty_table().to_pandas()
        if phys.projections is not None:
            cols = list(phys.projections) + [k for k in phys.keys if k not in phys.projections]
            rows = pd.DataFrame({c: pd.Series(dtype="float64") for c in cols})
        else:
            rows = empty

    partial = _partial_aggregate(rows, phys) if phys.aggs else rows
    m = WorkerMetrics(
        worker_id=worker_id,
        n_files=len(files),
        row_groups_total=scan.metrics.row_groups_total,
        row_groups_scanned=scan.metrics.row_groups_scanned,
        rows_read=scan.metrics.rows_read,
        rows_out=int(len(rows)),
        compressed_bytes=scan.metrics.compressed_bytes,
        uncompressed_bytes=scan.metrics.uncompressed_bytes,
        wall_time_s=time.monotonic() - t0,
        ledger=vars(client.ledger).copy(),
    )
    return partial, m
