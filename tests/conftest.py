"""Shared fixtures for the test suite (the Spark session fixture lives in
the repository-root conftest.py)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.graph.index import TemporalBipartiteIndex
from repro.synth_data import figure2_edges


@pytest.fixture(scope="session")
def fig2() -> TemporalBipartiteIndex:
    """The paper's Figure-2 running-example graph."""
    return TemporalBipartiteIndex.from_pandas(figure2_edges())


#: The paper's Example 2.2 ground truth at τ_U=τ_V=2, λ=3.
FIG2_MFGS = {
    frozenset({1, 2, 3, 5}): {1, 3, 4},
    frozenset({2, 3, 4}): {3, 5, 6},
    frozenset({3, 4, 5}): {2, 3, 5, 6},
}


def random_temporal_graph(
    seed: int,
    n_u: int = 5,
    n_v: int = 7,
    n_t: int = 5,
    density: float = 0.4,
) -> TemporalBipartiteIndex:
    """Small random temporal bipartite graph, deterministic in ``seed``."""
    rng = np.random.default_rng(seed)
    edges = [
        (u, v, t)
        for u in range(n_u)
        for v in range(n_v)
        for t in range(n_t)
        if rng.random() < density
    ]
    if not edges:
        edges = [(0, 0, 0)]
    return TemporalBipartiteIndex(edges)
