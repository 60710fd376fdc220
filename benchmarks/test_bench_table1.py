"""Benchmark for Table 1 / Fig 5: the invocation discrete-event simulation."""
from repro.faas import invocation as inv


def test_bench_table1_region_characteristics(benchmark):
    rows = benchmark(inv.table1)
    assert len(rows) == 4


def test_bench_fig5_two_level_4096(benchmark):
    tl = benchmark(inv.simulate_two_level, 4096, inv.REGIONS["us"], cold=True)
    assert tl.last_initiated < 3.0


def test_bench_driver_only_4096(benchmark):
    tl = benchmark(inv.simulate_driver_invocations, 4096, inv.REGIONS["us"])
    assert 13 < tl.last_initiated < 18.5
