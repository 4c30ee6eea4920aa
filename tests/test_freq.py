"""Frequency-verification tests: CheckFRE ≡ naive ≡ support-timestamp
counting, on the paper example and on randomized graphs."""
from __future__ import annotations

from itertools import combinations

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.freq import (
    check_fre,
    common_s_neighbors,
    is_frequent_naive,
    support_timestamps,
)
from tests.conftest import random_temporal_graph


def _support_reference(index, vs, tau_u):
    """Definition 2.4 verbatim: t supports V_S iff |⋂ Γ(v,t)| ≥ τ_U."""
    out = set()
    for t in index.timestamps:
        common = None
        for v in vs:
            nbrs = index.m_neighbors_v(v, t)
            common = nbrs if common is None else common & nbrs
        if common is not None and len(common) >= tau_u:
            out.add(t)
    return out


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("tau_u", [1, 2, 3])
def test_support_timestamps_matches_reference(seed, tau_u):
    g = random_temporal_graph(seed)
    vees = sorted(g.n_v)
    for size in (1, 2, 3):
        for vs in combinations(vees[:5], size):
            assert support_timestamps(g, vs, tau_u) == _support_reference(
                g, vs, tau_u
            )


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("tau_u,lam", [(1, 1), (2, 2), (2, 3), (3, 1)])
def test_check_fre_equals_naive(seed, tau_u, lam):
    g = random_temporal_graph(seed)
    vees = sorted(g.n_v)
    for size in (1, 2, 3):
        for vs in combinations(vees[:5], size):
            us = common_s_neighbors(g, vs)
            expected = len(support_timestamps(g, vs, tau_u)) >= lam
            assert check_fre(g, us, vs, tau_u, lam) is expected
            assert is_frequent_naive(g, vs, tau_u, lam) is expected


@settings(max_examples=60, deadline=None)
@given(
    seed=st.integers(0, 10_000),
    tau_u=st.integers(1, 3),
    lam=st.integers(1, 4),
    size=st.integers(1, 4),
)
def test_check_fre_property(seed, tau_u, lam, size):
    """Hypothesis: CheckFRE agrees with the definitional count on random
    graphs and random member sets."""
    g = random_temporal_graph(seed)
    vees = sorted(g.n_v)[:size]
    if not vees:
        return
    us = common_s_neighbors(g, vees)
    expected = len(_support_reference(g, vees, tau_u)) >= lam
    assert check_fre(g, us, vees, tau_u, lam) is expected


def test_empty_set_is_not_frequent(fig2):
    assert support_timestamps(fig2, [], 1) == set()
    assert is_frequent_naive(fig2, [], 1, 1) is False
    assert check_fre(fig2, set(fig2.n_u), [], 1, 1) is False


def test_common_s_neighbors_empty_vs_is_all_u(fig2):
    assert common_s_neighbors(fig2, []) == {1, 2, 3, 4, 5}


def test_single_vertex_support_is_degree_threshold(fig2):
    # {v1}: δ(v1,t) ≥ 2 exactly at t ∈ {1,2,3,4}.
    assert support_timestamps(fig2, [1], 2) == {1, 2, 3, 4}
    assert check_fre(fig2, fig2.s_neighbors_v(1), [1], 2, 4) is True
    assert check_fre(fig2, fig2.s_neighbors_v(1), [1], 2, 5) is False
