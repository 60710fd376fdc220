"""Lambada engine end-to-end: oracle-checked results, worker accounting,
error reporting. Q1/Q6 run once (session fixtures); extra runs here vary the
worker count and failure modes."""
import pytest

from repro import oracle
from repro.core import engine, queries
from repro.core.frontend import Lambada


class TestQ1:
    def test_result_matches_duckdb(self, mq1, lineitem_ds):
        _, pdf = lineitem_ds
        oracle.assert_equivalent(mq1.result.spark_df, queries.Q1_SQL, lineitem=pdf)

    def test_one_worker_per_file(self, mq1):
        assert mq1.result.n_workers == 16

    def test_all_workers_reported(self, mq1):
        ids = sorted(w.worker_id for w in mq1.result.metrics.workers)
        assert ids == list(range(16))

    def test_selectivity_near_95_percent(self, mq1):
        """Paper: Q1 selects 98 % (ours ~95 % — uniform dates to 1998-12-31)."""
        assert 0.90 < mq1.row_selectivity < 0.99

    def test_most_row_groups_scanned(self, mq1):
        assert mq1.rowgroup_scan_fraction > 0.9

    def test_scan_reads_only_seven_columns(self, mq1):
        """Projection push-down: Q1 'uses seven attributes' — the scan reads
        less than the full table, and the data GETs beyond the footer window
        track the used columns (±chunk rounding)."""
        used_comp, _ = mq1.info.used_column_bytes(queries.Q1_COLUMNS)
        bytes_read = mq1.result.metrics.bytes_read
        assert bytes_read < mq1.info.total_compressed_bytes
        footer_windows = mq1.result.n_workers * (1 << 14)  # one per file
        assert bytes_read - footer_windows < used_comp * 1.6

    def test_four_aggregate_rows(self, mq1):
        # 3 returnflags x 2 linestatuses with data = 6 groups
        assert len(mq1.result.result) == 6


class TestQ6:
    def test_result_matches_duckdb(self, mq6, lineitem_ds):
        _, pdf = lineitem_ds
        oracle.assert_equivalent(mq6.result.spark_df, queries.Q6_SQL, lineitem=pdf)

    def test_selectivity_near_2_percent(self, mq6):
        """Paper: Q6 'selects only 2% of the relation'."""
        assert 0.005 < mq6.row_selectivity < 0.05

    def test_majority_of_workers_pruned(self, mq6):
        """Paper Fig 11: ~80 % of Q6 workers prune all row groups."""
        assert 0.6 <= mq6.pruned_worker_fraction <= 0.95

    def test_pruned_workers_read_almost_nothing(self, mq6):
        pruned = [w for w in mq6.result.metrics.workers if w.pruned_all]
        assert pruned
        for w in pruned:
            assert w.rows_read == 0
            # footer/metadata reads only (a handful at test-file granularity;
            # exactly one at the paper's 64 KiB footer on 500 MB files)
            assert w.ledger_obj().gets <= 4
            assert w.ledger_obj().bytes_read < 0.5 * (
                mq6.info.total_compressed_bytes / mq6.info.n_files
            )

    def test_q6_cheaper_than_q1_in_bytes(self, mq1, mq6):
        """Selection + projection push-down pay off."""
        assert mq6.result.metrics.bytes_read < 0.5 * mq1.result.metrics.bytes_read


class TestEngineMechanics:
    def test_listing1_pipeline(self, spark, store_root, lineitem_ds):
        info, pdf = lineitem_ds
        src = Lambada(store_root).from_files(info.files)
        res = engine.run_query(spark, store_root, queries.listing1(src), n_workers=4)
        oracle.assert_equivalent(res.spark_df, queries.LISTING1_SQL, lineitem=pdf)

    def test_fewer_workers_than_files(self, spark, store_root, lineitem_ds):
        info, pdf = lineitem_ds
        src = Lambada(store_root).from_files(info.files)
        res = engine.run_query(spark, store_root, queries.q6(src), files_per_worker=4)
        assert res.n_workers == 4
        oracle.assert_equivalent(res.spark_df, queries.Q6_SQL, lineitem=pdf)

    def test_worker_count_capped_at_files(self, spark, store_root, lineitem_ds):
        info, _ = lineitem_ds
        src = Lambada(store_root).from_files(info.files)
        res = engine.run_query(spark, store_root, queries.q6(src), n_workers=999)
        assert res.n_workers == 16

    def test_conflicting_worker_args_rejected(self, spark, store_root, lineitem_ds):
        info, _ = lineitem_ds
        src = Lambada(store_root).from_files(info.files)
        with pytest.raises(ValueError):
            engine.run_query(
                spark, store_root, queries.q6(src), n_workers=2, files_per_worker=2
            )

    def test_oom_reported_not_silent(self, spark, store_root, lineitem_ds):
        """§3.3: the handler reports OOM 'to the driver rather than dying
        silently' through the result queue."""
        info, _ = lineitem_ds
        src = Lambada(store_root).from_files(info.files)
        with pytest.raises(engine.WorkerError, match="WorkerOOM"):
            engine.run_query(
                spark, store_root, queries.q1(src), n_workers=2, memory_limit_mib=1
            )

    def test_from_parquet_glob(self, spark, store_root, lineitem_ds):
        info, _ = lineitem_ds
        src = Lambada(store_root).from_parquet(info.bucket, info.prefix)
        assert len(src.plan.files) == 16

    def test_from_parquet_missing_prefix(self, store_root):
        with pytest.raises(FileNotFoundError):
            Lambada(store_root).from_parquet("data", "nothing-here")

    def test_driver_final_agg_uses_spark(self, mq1):
        # the driver scope is a Spark DataFrame (Catalyst plan), not pandas
        assert mq1.result.spark_df.schema is not None
        assert "count_order" in mq1.result.spark_df.columns
