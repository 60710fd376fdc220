"""Spark-phased executor for the S3 exchange operators (paper §4.4, Alg 1-2).

Every level of the exchange is one Spark job whose tasks are the serverless
workers (``groupBy(worker).applyInPandas``); **all data moves through the
simulated S3, never through Spark's own shuffle**, reproducing the paper's
communication topology. The Spark action at the end of each phase is the
barrier that the paper realises by polling S3 until all senders' files exist.

Phases for a k-level exchange:

  0. *distribute*: each source worker writes its input share R_p ("in/w{p}");
  1..k. *level l*: every worker (``spark.range(P)`` keeps empty workers
     alive) reads the level-(l-1) files addressed to it (or its input share),
     partitions the rows by the level-l coordinate of their partition ID, and
     writes one file per group member (or one combined file under write
     combining — offsets in the key, discovered via LIST);
  k+1. *collect*: every worker reads its final files and returns the rows,
     which must now all satisfy ``partition_id == worker_id``.

Per-phase request ledgers are written to a side channel (not billed — it
stands outside the algorithm) and summed into an :class:`ExchangeReport`,
which tests assert equals :func:`algorithms.expected_requests` exactly.
"""
from __future__ import annotations

import dataclasses
import json
import uuid
from pathlib import Path

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..s3.store import Ledger, NoSuchKey, S3Client, S3Store
from . import algorithms as alg
from . import naming, serde

META_BUCKET = "xmeta"


@dataclasses.dataclass
class ExchangeReport:
    """Accounting of one exchange run."""

    spec: alg.ExchangeSpec
    n_workers: int
    dims: tuple
    input_rows: int
    output_rows: int
    ledger: Ledger  # exchange requests only (levels + collect)
    input_ledger: Ledger  # the distribute/read-input traffic (the "scan")
    per_phase: list  # Ledger per level phase

    @property
    def requests(self) -> dict:
        return {"puts": self.ledger.puts, "gets": self.ledger.gets, "lists": self.ledger.lists}


def _meta_dir(store_root: str, run_id: str) -> Path:
    d = Path(store_root) / META_BUCKET / run_id
    d.mkdir(parents=True, exist_ok=True)
    return d


def _write_side_ledger(store_root: str, run_id: str, phase: str, worker: int, ledger: Ledger):
    # side channel: raw file write, not an S3 request of the algorithm
    p = _meta_dir(store_root, run_id) / f"{phase}-w{worker}.json"
    p.write_text(ledger.to_json())


def _read_side_ledgers(store_root: str, run_id: str, phase: str) -> list[Ledger]:
    d = _meta_dir(store_root, run_id)
    return [Ledger.from_json(p.read_text()) for p in sorted(d.glob(f"{phase}-w*.json"))]


def _read_level_files(
    client: S3Client, run_id: str, level: int, p: int, dims: tuple, spec: alg.ExchangeSpec
) -> list[pd.DataFrame]:
    """Read the level-``level`` parts addressed to worker ``p``."""
    d = dims[level]
    gid = alg.group_id(p, dims, level)
    bucket = naming.bucket_for_group(gid, spec.n_buckets)
    my = alg.level_coord(p, dims, level)
    frames = []
    if spec.write_combining and spec.offsets_mode == "filename":
        # one LIST discovers every sender's key, offsets included in the name
        keys = client.list(bucket, naming.group_prefix(run_id, level, gid))
        if len(keys) != d:
            raise RuntimeError(f"group {gid} level {level}: saw {len(keys)} of {d} senders")
        for key in keys:
            _, lengths = naming.parse_combined(key)
            off, length = serde.part_range(lengths, my)
            blob = client.get(bucket, key, offset=off, length=length)
            if length:
                frames.append(serde.bytes_to_frame(blob))
    elif spec.write_combining:  # sidecar offsets file: two GETs per sender
        for s in range(d):
            lengths = json.loads(
                client.get(bucket, naming.sidecar_offsets_key(run_id, level, gid, s))
            )
            off, length = serde.part_range(lengths, my)
            blob = client.get(
                bucket, naming.sidecar_data_key(run_id, level, gid, s), offset=off, length=length
            )
            if length:
                frames.append(serde.bytes_to_frame(blob))
    else:
        # readiness poll: one LIST per worker (Table 2's O(P) #lists)
        client.list(bucket, naming.group_prefix(run_id, level, gid))
        for s in range(d):
            blob = client.get(bucket, naming.part_key(run_id, level, gid, s, my))
            frames.append(serde.bytes_to_frame(blob))
    return frames


def _write_level_files(
    client: S3Client,
    run_id: str,
    level: int,
    p: int,
    dims: tuple,
    spec: alg.ExchangeSpec,
    rows: pd.DataFrame,
):
    """Partition ``rows`` by the level coordinate of pid and write all parts
    (empty parts included — receivers poll for every sender's file)."""
    d = dims[level]
    gid = alg.group_id(p, dims, level)
    bucket = naming.bucket_for_group(gid, spec.n_buckets)
    me = alg.level_coord(p, dims, level)
    target = rows["pid"].map(lambda x: alg.level_coord(int(x), dims, level)) if len(rows) else None
    parts = []
    for v in range(d):
        part = rows[target == v] if len(rows) else rows
        parts.append(serde.frame_to_bytes(part))
    if spec.write_combining:
        blob, lengths = serde.combine(parts)
        if spec.offsets_mode == "filename":
            client.put(bucket, naming.combined_key(run_id, level, gid, me, lengths), blob)
        else:
            client.put(
                bucket,
                naming.sidecar_offsets_key(run_id, level, gid, me),
                json.dumps(lengths).encode(),
            )
            client.put(bucket, naming.sidecar_data_key(run_id, level, gid, me), blob)
    else:
        for v, payload in enumerate(parts):
            client.put(bucket, naming.part_key(run_id, level, gid, me, v), payload)


def run_exchange(
    spark: SparkSession,
    df: DataFrame,
    n_workers: int,
    spec: alg.ExchangeSpec,
    store: S3Store,
    *,
    key_col: str = "k",
    run_id: str | None = None,
) -> tuple[DataFrame, ExchangeReport]:
    """Exchange ``df`` among ``n_workers`` serverless workers so that every
    record ends on the worker given by ``hash(key) % n_workers``.

    Returns the collected output (with ``pid`` and ``worker`` columns, which
    must agree) and the request accounting.
    """
    run_id = run_id or uuid.uuid4().hex[:8]
    dims = alg.grid_dims(n_workers, spec.levels)
    for b in naming.exchange_buckets(spec.n_buckets):
        store.create_bucket(b)
    store.create_bucket(META_BUCKET)
    root = str(store.root)

    # partition ID and source-worker assignment (both hash-based, as in Alg 1)
    df2 = df.withColumn(
        "pid", F.pmod(F.xxhash64(F.col(key_col)), F.lit(n_workers)).cast("int")
    ).withColumn(
        "src", F.pmod(F.xxhash64(F.col(key_col), F.lit(run_id)), F.lit(n_workers)).cast("int")
    )
    template = serde.frame_to_bytes(df2.drop("src").limit(0).toPandas())
    in_bucket = naming.bucket_for_group(0, spec.n_buckets)

    # ---- phase 0: distribute input shares (the relation R of Algorithm 1)
    def _distribute(key, pdf):
        p = int(key[0])
        client = S3Client(root)
        client.put(in_bucket, naming.input_key(run_id, p), serde.frame_to_bytes(pdf.drop(columns=["src"])))
        _write_side_ledger(root, run_id, "in", p, client.ledger)
        return pd.DataFrame({"worker": [p], "rows": [len(pdf)]})

    n_in = (
        df2.groupBy("src")
        .applyInPandas(_distribute, schema="worker int, rows long")
        .agg(F.sum("rows"))
        .collect()[0][0]
    )

    workers = spark.range(n_workers).withColumnRenamed("id", "worker")

    # ---- level phases: read previous, partition, write this level
    def _level_phase(level):
        def fn(key, pdf):
            p = int(key[0])
            client = S3Client(root)
            if level == 0:
                try:
                    rows = serde.bytes_to_frame(client.get(in_bucket, naming.input_key(run_id, p)))
                    input_gets = 1
                except NoSuchKey:  # source worker had no rows: nothing billed
                    rows = serde.bytes_to_frame(template)
                    input_gets = 0
            else:
                frames = _read_level_files(client, run_id, level - 1, p, dims, spec)
                rows = (
                    pd.concat(frames, ignore_index=True)
                    if frames
                    else serde.bytes_to_frame(template)
                )
                input_gets = 0
            _write_level_files(client, run_id, level, p, dims, spec, rows)
            # split the ledger: the phase-0 input GET belongs to the scan,
            # not to the exchange accounting
            if input_gets:
                inl = Ledger()
                inl.record("gets", in_bucket, 0)
                inl.gets = input_gets
                client.ledger.gets -= input_gets
                client.ledger.per_bucket[in_bucket]["gets"] -= input_gets
                _write_side_ledger(root, run_id, "inget", p, inl)
            _write_side_ledger(root, run_id, f"lvl{level}", p, client.ledger)
            return pd.DataFrame({"worker": [p], "rows": [len(rows)]})

        return fn

    for level in range(spec.levels):
        workers.groupBy("worker").applyInPandas(
            _level_phase(level), schema="worker int, rows long"
        ).count()  # the action is the barrier

    # ---- collect phase: read the final level's files
    out_schema = df2.drop("src").withColumn("worker", F.lit(0)).schema

    def _collect(key, pdf):
        p = int(key[0])
        client = S3Client(root)
        frames = _read_level_files(client, run_id, spec.levels - 1, p, dims, spec)
        rows = pd.concat(frames, ignore_index=True) if frames else serde.bytes_to_frame(template)
        _write_side_ledger(root, run_id, "collect", p, client.ledger)
        rows["worker"] = p
        return rows

    out = workers.groupBy("worker").applyInPandas(_collect, schema=out_schema)
    out = out.cache()
    n_out = out.count()

    # ---- accounting
    input_ledger = Ledger()
    for led in _read_side_ledgers(root, run_id, "in") + _read_side_ledgers(root, run_id, "inget"):
        input_ledger.merge(led)
    total = Ledger()
    per_phase = []
    for level in range(spec.levels):
        phase = Ledger()
        for led in _read_side_ledgers(root, run_id, f"lvl{level}"):
            phase.merge(led)
        per_phase.append(phase)
        total.merge(phase)
    collect_ledger = Ledger()
    for led in _read_side_ledgers(root, run_id, "collect"):
        collect_ledger.merge(led)
    total.merge(collect_ledger)

    report = ExchangeReport(
        spec=spec,
        n_workers=n_workers,
        dims=dims,
        input_rows=int(n_in or 0),
        output_rows=int(n_out),
        ledger=total,
        input_ledger=input_ledger,
        per_phase=per_phase,
    )
    return out, report
