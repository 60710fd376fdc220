"""Fig 1 (intro simulation) and the executor-model comparison claims."""
import pytest

from repro.qaas.spark_baseline import scheduling_comparison
from repro.sim import constants as C
from repro.sim import figure1 as f1


class TestFig1aJobScoped:
    def test_more_workers_reduce_latency_with_diminishing_gain(self):
        """'adding more resources reduces the running time, but with a
        diminishing gain as we approach the respective startup time'."""
        pts = f1.figure1a()["faas"]
        lat = [p.latency_s for p in pts]
        assert lat == sorted(lat, reverse=True)
        assert lat[-1] > C.FAAS_STARTUP_S  # floor at the startup time

    def test_iaas_floor_is_two_minutes(self):
        pts = f1.figure1a()["iaas"]
        assert min(p.latency_s for p in pts) > C.IAAS_STARTUP_S

    def test_iaas_up_to_an_order_of_magnitude_cheaper(self):
        """'To obtain the lowest cost, IaaS is thus more attractive, being up
        to an order of magnitude cheaper.'"""
        sweep = f1.figure1a()
        best_iaas = min(p.cost_usd for p in sweep["iaas"])
        best_faas = min(p.cost_usd for p in sweep["faas"])
        assert 3 < best_faas / best_iaas < 20

    def test_only_faas_reaches_interactive_latency(self):
        """'if query latency is important ... FaaS is more attractive'."""
        sweep = f1.figure1a()
        assert min(p.latency_s for p in sweep["faas"]) < C.INTERACTIVE_TARGET_S
        assert min(p.latency_s for p in sweep["iaas"]) > C.INTERACTIVE_TARGET_S

    def test_faas_cost_grows_with_workers(self):
        """Start-up overhead: more workers do not amortise the 4 s floor."""
        pts = f1.figure1a()["faas"]
        assert pts[-1].cost_usd > pts[0].cost_usd


class TestFig1bAlwaysOn:
    def test_tier_instance_counts_meet_10s_target(self):
        """Footnote: 3 DRAM / 7 NVMe / 13 S3 instances for the 10 s target."""
        for tier in ("dram", "nvme", "s3"):
            assert f1.tier_latency(tier) <= C.INTERACTIVE_TARGET_S

    def test_tier_hourly_cost_ordering(self):
        """DRAM (3 instances) is the cheapest way to always-on interactivity."""
        assert (
            f1.always_on_hourly("dram")
            < f1.always_on_hourly("nvme")
            < f1.always_on_hourly("s3")
        )

    def test_faas_per_query_much_cheaper_than_qaas(self):
        """Fig 1b: the FaaS line has a much lower slope than QaaS."""
        assert f1.qaas_per_query_cost() / f1.faas_per_query_cost() > 5

    def test_hourly_cost_linear_in_frequency_for_faas(self):
        a = f1.figure1b_hourly(1)["faas"]
        b = f1.figure1b_hourly(10)["faas"]
        assert b == pytest.approx(10 * a)

    def test_always_on_flat_in_frequency(self):
        assert f1.figure1b_hourly(1)["dram"] == f1.figure1b_hourly(100)["dram"]

    def test_breakeven_at_moderate_query_load(self):
        """'even a moderate query load makes [FaaS/QaaS] more expensive than
        IaaS' — the crossover sits at tens of queries per hour."""
        be = f1.faas_breakeven_queries_per_hour()
        assert 5 < be < 100

    def test_sporadic_use_favors_faas(self):
        rates = f1.figure1b_hourly(0.1)
        assert rates["faas"] < min(rates["dram"], rates["nvme"], rates["s3"])


class TestSchedulingComparison:
    def test_lambada_wins_latency_everywhere(self):
        """Serverless scheduling avoids the cluster-startup floor."""
        for row in scheduling_comparison():
            assert row["lambada_latency_s"] < row["spark_executor_latency_s"]

    def test_executor_model_wins_cost_at_small_scale(self):
        rows = scheduling_comparison()
        assert rows[0]["spark_executor_cost_usd"] < rows[0]["lambada_cost_usd"]

    def test_interactive_only_via_faas(self):
        rows = scheduling_comparison()
        assert any(r["lambada_latency_s"] < 15 for r in rows)
        assert all(r["spark_executor_latency_s"] > 100 for r in rows)
