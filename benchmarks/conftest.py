"""Benchmark-scale fixtures (SF larger than unit tests, still laptop-fast)."""
import pytest

from repro.graph.bipartite import BipartiteGraph
from repro.synth_data import jd_transactions

#: Benchmark scale: ~20k edges for jd1.
BENCH_SCALE = 0.02


@pytest.fixture(scope="session", params=["jd1", "jd2", "jd3"])
def jd_bench(request):
    preset = request.param
    edges, users, meta = jd_transactions(preset, scale=BENCH_SCALE, seed=0)
    g = BipartiteGraph.from_pandas(edges, n_u=meta["n_pin"], n_v=meta["n_merchant"])
    truth = users.loc[users["is_fraud"], "pin"].to_numpy()
    return preset, edges, g, truth, meta
