"""Sorted-Parquet LINEITEM layout in the simulated S3 (paper §5.1)."""
import io

import pyarrow.parquet as pq
import pytest

from repro.s3.store import S3Client


class TestPreparedLayout:
    def test_row_count_matches_sf(self, lineitem_ds):
        info, pdf = lineitem_ds
        assert info.n_rows == 60_000 == len(pdf)

    def test_file_count(self, lineitem_ds):
        info, _ = lineitem_ds
        assert info.n_files == 16
        assert len(info.files) == 16

    def test_sorted_by_shipdate(self, lineitem_ds):
        """'we sort the LINEITEM relation by l_shipdate in order to show the
        effect of selection push downs'."""
        _, pdf = lineitem_ds
        assert pdf["l_shipdate"].is_monotonic_increasing

    def test_files_cover_disjoint_date_ranges(self, store_root, lineitem_ds):
        info, _ = lineitem_ds
        client = S3Client(store_root)
        ranges = []
        for bucket, key in info.files:
            meta = pq.ParquetFile(io.BytesIO(client.get(bucket, key))).metadata
            cols = {meta.schema.column(i).name: i for i in range(meta.num_columns)}
            idx = cols["l_shipdate"]
            mins = [meta.row_group(r).column(idx).statistics.min for r in range(meta.num_row_groups)]
            maxs = [meta.row_group(r).column(idx).statistics.max for r in range(meta.num_row_groups)]
            ranges.append((min(mins), max(maxs)))
        for (_, hi), (lo, _) in zip(ranges, ranges[1:]):
            assert hi <= lo

    def test_row_groups_have_statistics(self, store_root, lineitem_ds):
        info, _ = lineitem_ds
        client = S3Client(store_root)
        meta = pq.ParquetFile(io.BytesIO(client.get(*info.files[0]))).metadata
        assert meta.num_row_groups == 2
        assert meta.row_group(0).column(0).statistics is not None

    def test_column_byte_accounting_sums_to_total(self, lineitem_ds):
        info, _ = lineitem_ds
        comp = sum(c for c, _ in info.column_bytes.values())
        # compressed column chunks are most of the file (rest is metadata)
        assert 0.7 * info.total_compressed_bytes < comp <= info.total_compressed_bytes

    def test_used_column_bytes_subset(self, lineitem_ds):
        info, _ = lineitem_ds
        comp, unc = info.used_column_bytes(["l_quantity", "l_discount"])
        assert 0 < comp < info.total_compressed_bytes
        assert comp < unc

    def test_round_trip_content(self, store_root, lineitem_ds):
        info, pdf = lineitem_ds
        client = S3Client(store_root)
        first = pq.read_table(io.BytesIO(client.get(*info.files[0]))).to_pandas()
        assert len(first) == 60_000 // 16
        assert first["l_shipdate"].max() <= pdf["l_shipdate"].iloc[len(first)]

    def test_bad_file_count_rejected(self, spark, store, lineitem_ds):
        from repro.core.dataset import prepare_lineitem

        with pytest.raises(ValueError):
            prepare_lineitem(spark, store, sf=0.0001, n_files=10**9)
