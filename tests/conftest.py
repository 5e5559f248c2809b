"""Shared fixtures: JD-lite graphs at unit-test scale, micro hand graphs."""
import numpy as np
import pytest

from repro.graph.bipartite import BipartiteGraph
from repro.synth_data import jd_transactions

#: Unit-test scale: ~2k edges per preset.
UNIT_SCALE = 0.002


@pytest.fixture(scope="session", params=["jd1", "jd2", "jd3"])
def jd_small(request):
    """(preset, edges, users, graph, truth, meta) at unit scale — all presets."""
    preset = request.param
    edges, users, meta = jd_transactions(preset, scale=UNIT_SCALE, seed=0)
    g = BipartiteGraph.from_pandas(edges, n_u=meta["n_pin"], n_v=meta["n_merchant"])
    truth = users.loc[users["is_fraud"], "pin"].to_numpy()
    return preset, edges, users, g, truth, meta


@pytest.fixture(scope="session")
def jd1_small():
    """Single-preset convenience variant of ``jd_small``."""
    edges, users, meta = jd_transactions("jd1", scale=UNIT_SCALE, seed=0)
    g = BipartiteGraph.from_pandas(edges, n_u=meta["n_pin"], n_v=meta["n_merchant"])
    truth = users.loc[users["is_fraud"], "pin"].to_numpy()
    return edges, users, g, truth, meta


@pytest.fixture
def micro_clique():
    from tests.helpers import clique_plus_noise

    return clique_plus_noise()
