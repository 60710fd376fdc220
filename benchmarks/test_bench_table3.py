"""Benchmark for Table 3: the exchange-runtime DES over the paper's sweep."""
import pytest

from repro.sim import baselines, exchange_runtime as xr


def _sweep():
    return {
        p: xr.lambada_table3_row(100e9, p) for p in (250, 500, 1000)
    } | {1250: xr.lambada_table3_row(1e12, 1250), 2500: xr.lambada_table3_row(3e12, 2500)}


def test_bench_table3_des(benchmark):
    rows = benchmark(_sweep)
    for p, paper_s in baselines.LAMBADA_TABLE3_S.items():
        assert rows[p] == pytest.approx(paper_s, rel=0.30)


def test_bench_pocket_s3_baseline(benchmark):
    t = benchmark(xr.pocket_s3_baseline_runtime)
    assert t == pytest.approx(baselines.POCKET_S3_SECONDS_250, rel=0.30)
