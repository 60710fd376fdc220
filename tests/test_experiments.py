"""Paper-scale experiment pipelines: Figs 10-12 claims from measured runs."""
import pytest

from repro.sim import experiments as X
from repro.sim import scaling


class TestFigure12:
    @pytest.fixture(scope="class")
    def rows1(self, mq1):
        return {(r["sf"], r["system"]): r for r in X.figure12_rows(mq1)}

    @pytest.fixture(scope="class")
    def rows6(self, mq6):
        return {(r["sf"], r["system"]): r for r in X.figure12_rows(mq6)}

    def test_lambada_latency_roughly_constant_across_scale(self, rows1):
        """§5.4.2: 'Lambada is the system that has the most constant
        latencies' (proportionally more workers)."""
        a, b = rows1[("1k", "lambada")], rows1[("10k", "lambada")]
        assert b["latency_s"] < 2 * a["latency_s"]

    def test_lambada_interactive_at_both_scales(self, rows1):
        """Abstract: 'queries over gigabytes to terabytes ... at interactive
        query latency' (<10 s for Q1)."""
        assert rows1[("1k", "lambada")]["latency_s"] < 10
        assert rows1[("10k", "lambada")]["latency_s"] < 10

    def test_athena_latency_ratio_q1(self, rows1):
        """Fig 12: ~4x at SF 1k, ~26x at SF 10k."""
        r1 = rows1[("1k", "athena")]["latency_s"] / rows1[("1k", "lambada")]["latency_s"]
        r10 = rows1[("10k", "athena")]["latency_s"] / rows1[("10k", "lambada")]["latency_s"]
        assert 2 < r1 < 8
        assert 12 < r10 < 40

    def test_athena_latency_ratio_q6_grows_with_scale(self, rows6):
        """Fig 12: Athena falls behind at SF 10k for Q6 as well (paper 15x)."""
        r10 = rows6[("10k", "athena")]["latency_s"] / rows6[("10k", "lambada")]["latency_s"]
        assert r10 > 8

    def test_bigquery_hot_faster_at_sf1k_slower_at_sf10k(self, rows1):
        """Fig 12: BQ hot 'significantly faster' at SF 1k, '~2.3x slower' at
        SF 10k for Q1."""
        assert rows1[("1k", "bigquery")]["latency_s"] < rows1[("1k", "lambada")]["latency_s"]
        ratio = rows1[("10k", "bigquery")]["latency_s"] / rows1[("10k", "lambada")]["latency_s"]
        assert 1.5 < ratio < 6

    def test_bigquery_cold_pays_the_load(self, rows1):
        """Fig 12: loading takes ~40 min / ~6.7 h (our table compresses
        harder per row, so the absolute load time is somewhat smaller)."""
        assert rows1[("1k", "bigquery")]["cold_latency_s"] > 1000
        assert rows1[("10k", "bigquery")]["cold_latency_s"] > 10000
        assert rows1[("10k", "bigquery")]["cold_latency_s"] == pytest.approx(
            10 * rows1[("1k", "bigquery")]["cold_latency_s"], rel=0.15
        )

    def test_lambada_order_of_magnitude_cheaper_than_athena_q1(self, rows1):
        """§5.4.3: 'about one and two orders of magnitude compared to Amazon
        Athena and Google BigQuery'."""
        for sf in ("1k", "10k"):
            assert rows1[(sf, "athena")]["cost_usd"] > 5 * rows1[(sf, "lambada")]["cost_usd"]
            assert rows1[(sf, "bigquery")]["cost_usd"] > 30 * rows1[(sf, "lambada")]["cost_usd"]

    def test_q6_athena_cost_near_parity(self, rows6):
        """§5.4.3: 'For Q6, Lambada is thus only slightly cheaper than
        Amazon Athena' (selection pushed into Athena's cost model)."""
        for sf in ("1k", "10k"):
            ratio = rows6[(sf, "lambada")]["cost_usd"] / rows6[(sf, "athena")]["cost_usd"]
            assert 0.3 < ratio < 3.0

    def test_bigquery_pays_for_unselected_rows(self, rows6):
        """BQ bills full columns -> Q6 is ~2 orders more expensive there."""
        for sf in ("1k", "10k"):
            assert rows6[(sf, "bigquery")]["cost_usd"] > 50 * rows6[(sf, "lambada")]["cost_usd"]


class TestFigure10:
    @pytest.fixture(scope="class")
    def sweep(self, mq1):
        rows = X.figure10_memory_sweep(mq1)
        return {(r["memory_mib"], r["run"]): r for r in rows}

    def test_bigger_memory_faster_up_to_one_vcpu(self, sweep):
        """'by increasing the worker size from 512 to 1796 MiB, execution
        gets significantly faster'."""
        assert sweep[(512, "hot")]["latency_s"] > 1.5 * sweep[(1792, "hot")]["latency_s"]

    def test_no_speedup_beyond_one_vcpu(self, sweep):
        """'As we increase the worker size further, the price increases ...
        without improving speed.'"""
        assert sweep[(3008, "hot")]["latency_s"] == pytest.approx(
            sweep[(1792, "hot")]["latency_s"], rel=0.1
        )

    def test_price_grows_beyond_one_vcpu(self, sweep):
        assert sweep[(3008, "hot")]["cost_usd"] > 1.3 * sweep[(1792, "hot")]["cost_usd"]

    def test_cold_slower_than_hot(self, sweep):
        """'a small penalty on the end-to-end latency of cold runs'."""
        for m in X.MEMORY_SWEEP:
            assert sweep[(m, "cold")]["latency_s"] > sweep[(m, "hot")]["latency_s"]

    def test_hot_q1_under_10s_at_all_sizes(self, sweep):
        """'both hot and cold execution return in less than 10 s'."""
        for m in X.MEMORY_SWEEP:
            assert sweep[(m, "hot")]["latency_s"] < 10

    def test_files_sweep_diminishing_gains(self, spark, store_root, lineitem_ds):
        """Fig 10b: more workers -> faster, at diminishing gains and rising
        cost (the Fig 1a trade-off)."""
        info, _ = lineitem_ds
        rows = X.figure10_files_sweep(spark, store_root, info)
        by_f = {r["files_per_worker"]: r for r in rows}
        assert by_f[1]["latency_s"] < by_f[2]["latency_s"] < by_f[4]["latency_s"]
        gain_42 = by_f[4]["latency_s"] / by_f[2]["latency_s"]
        gain_21 = by_f[2]["latency_s"] / by_f[1]["latency_s"]
        assert gain_21 < gain_42  # diminishing


class TestFigure11:
    def test_q1_two_categories(self, mq1):
        """Fig 11: workers are either ~0.1-0.2 s (pruned) or ~2-3 s."""
        d = X.figure11_distribution(mq1)
        assert 1.0 < d["median_s"] < 4.0
        assert d["slowest_s"] < 4.5

    def test_q6_mostly_pruned(self, mq6):
        d = X.figure11_distribution(mq6)
        assert d["fastest_s"] < 0.25  # metadata-only workers
        assert d["median_s"] < 0.25  # ~80 % pruned => median is pruned
        assert 1.0 < d["slowest_s"] < 4.5  # scanning workers

    def test_pruned_fractions_match_selectivities(self, mq1, mq6):
        """§5.3: pruning fraction 'corresponds to the respective selectivity
        of the filter on l_shipdate'."""
        assert mq6.pruned_worker_fraction > 0.5
        assert mq1.pruned_worker_fraction < 0.2


class TestScalingPipeline:
    def test_scaled_fleet_size(self, mq1):
        scaled = scaling.scale_query(
            mq1.result.metrics, mq1.info.n_rows / mq1.result.n_workers, scaling.SF1K
        )
        assert scaled.n_workers == 320

    def test_pruning_fraction_survives_scaling(self, mq6):
        scaled = scaling.scale_query(
            mq6.result.metrics, mq6.info.n_rows / mq6.result.n_workers, scaling.SF1K
        )
        frac = scaled.n_pruned / scaled.n_workers
        assert frac == pytest.approx(mq6.pruned_worker_fraction, abs=0.1)
