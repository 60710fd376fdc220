"""Measure-small, model-big: project measured metrics to paper scale (§5.1).

The paper evaluates LINEITEM at SF 1000 (6e9 rows, 320 Parquet files) and
SF 10000 (10x replicated files). We run the real engine at SF <= 0.1, then
scale each worker's *byte and row volumes* linearly in rows-per-worker while
keeping per-file request counts fixed (the paper fixes files at ~500 MB and
scales the worker count with the data, so per-worker request patterns are
scale-free). Pruning fractions and selectivities are layout properties and
carry over unchanged.
"""
from __future__ import annotations

import copy
import dataclasses

from ..core.metrics import QueryMetrics, WorkerMetrics
from . import constants as C


def scale_worker(m: WorkerMetrics, row_factor: float) -> WorkerMetrics:
    """Scale one worker's data volumes by ``row_factor`` (requests/files per
    worker are layout-invariant and stay fixed)."""
    s = copy.deepcopy(m)
    for f in ("rows_read", "rows_out", "compressed_bytes", "uncompressed_bytes"):
        setattr(s, f, int(getattr(m, f) * row_factor))
    if s.ledger:
        s.ledger = dict(s.ledger)
        s.ledger["bytes_read"] = int(s.ledger.get("bytes_read", 0) * row_factor)
        s.ledger["bytes_written"] = int(s.ledger.get("bytes_written", 0) * row_factor)
    return s


@dataclasses.dataclass
class PaperScale:
    """A paper-scale target: how many rows each worker handles."""

    sf: float
    n_files: int

    @property
    def rows_total(self) -> int:
        return int(C.PAPER_LINEITEM_ROWS * self.sf / C.PAPER_SF)

    def rows_per_worker(self, files_per_worker: int = 1) -> float:
        return self.rows_total / self.n_files * files_per_worker


#: The paper's two scale factors (§5.4): SF 10k replicates SF 1k's files 10x.
SF1K = PaperScale(sf=1000.0, n_files=320)
SF10K = PaperScale(sf=10000.0, n_files=3200)


def scale_query(
    metrics: QueryMetrics, measured_rows_per_worker: float, target: PaperScale, files_per_worker: int = 1
) -> QueryMetrics:
    """Project a measured query run to a paper-scale run.

    The measured run must use the same *relative* layout (files sorted by
    l_shipdate, one worker per ``files_per_worker`` files); each measured
    worker then corresponds to a paper worker with ``row_factor`` more rows.
    The worker fleet is replicated (preserving worker order, i.e. the
    shipdate position of each worker's files) up to the paper's worker count,
    so pruning fractions carry over.
    """
    row_factor = target.rows_per_worker(files_per_worker) / measured_rows_per_worker
    scaled = [scale_worker(w, row_factor) for w in metrics.workers]
    target_workers = max(1, target.n_files // files_per_worker)
    fleet = []
    for i in range(target_workers):
        # stretch the measured fleet over the target fleet order-preservingly
        src = scaled[min(len(scaled) - 1, i * len(scaled) // target_workers)]
        w = copy.deepcopy(src)
        w.worker_id = i
        fleet.append(w)
    return QueryMetrics(fleet)
