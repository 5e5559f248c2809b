"""Benchmark for Table I — JD-lite dataset generation throughput.

Table I itself is dataset statistics; its regenerable artifact here is
the generator run that produces those statistics (jobs/table1_stats.py
prints the actual rows)."""
import pytest

from repro.synth_data import jd_transactions


@pytest.mark.parametrize("preset", ["jd1", "jd2", "jd3"])
def test_bench_table1_generation(benchmark, preset):
    edges, users, meta = benchmark(jd_transactions, preset, scale=0.02, seed=0)
    assert meta["n_edge"] > 0
