"""Unit tests for the TemporalBipartiteIndex substrate."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.graph.index import TemporalBipartiteIndex


@pytest.fixture()
def small() -> TemporalBipartiteIndex:
    return TemporalBipartiteIndex(
        [(1, 10, 0), (1, 11, 0), (2, 10, 1), (1, 10, 1), (2, 11, 1)]
    )


class TestConstruction:
    def test_edge_count(self, small):
        assert len(small) == 5

    def test_duplicate_edges_are_dropped(self):
        idx = TemporalBipartiteIndex([(1, 10, 0), (1, 10, 0), (1, 10, 0)])
        assert len(idx) == 1

    def test_timestamps_sorted(self, small):
        assert small.timestamps == (0, 1)

    def test_t_pos_dense(self):
        idx = TemporalBipartiteIndex([(1, 10, 5), (1, 10, 100), (1, 10, 7)])
        assert idx.t_pos == {5: 0, 7: 1, 100: 2}

    def test_vertex_lists(self, small):
        assert small.u_vertices == [1, 2]
        assert small.v_vertices == [10, 11]

    def test_from_pandas_roundtrip(self, small):
        again = TemporalBipartiteIndex.from_pandas(small.to_pandas())
        assert sorted(again.edges_iter()) == sorted(small.edges_iter())

    def test_empty(self):
        idx = TemporalBipartiteIndex([])
        assert len(idx) == 0
        assert idx.timestamps == ()


class TestNeighborhoods:
    def test_s_neighbors(self, small):
        assert small.s_neighbors_v(10) == {1, 2}
        assert small.s_neighbors_u(1) == {10, 11}

    def test_m_neighbors(self, small):
        assert small.m_neighbors_v(10, 0) == {1}
        assert small.m_neighbors_v(10, 1) == {1, 2}
        assert small.m_neighbors_u(2, 1) == {10, 11}

    def test_missing_vertex_is_empty(self, small):
        assert small.m_neighbors_v(99, 0) == set()
        assert small.s_neighbors_u(99) == set()

    def test_m_degrees(self, small):
        assert small.m_degree_v(10, 1) == 2
        assert small.m_degree_u(1, 0) == 2
        assert small.m_degree_u(2, 0) == 0


class TestDerived:
    def test_t_of_v(self, small):
        # δ(10, 0) = 1, δ(10, 1) = 2.
        assert small.t_of_v(10, 2) == frozenset({1})
        assert small.t_of_v(10, 1) == frozenset({0, 1})

    def test_edge_ts_positions(self, small):
        np.testing.assert_array_equal(small.edge_ts[(1, 10)], [0, 1])
        np.testing.assert_array_equal(small.edge_ts[(2, 10)], [1])

    def test_v_edge_keys_multiplicity(self, small):
        # v=10 has edges (1,t0), (1,t1), (2,t1) → keys 1*2+0, 1*2+1, 2*2+1.
        np.testing.assert_array_equal(small.v_edge_keys(10), [2, 3, 5])

    def test_v_edge_keys_cached(self, small):
        assert small.v_edge_keys(10) is small.v_edge_keys(10)

    def test_separate_id_namespaces(self):
        # u=1 and v=1 are different vertices.
        idx = TemporalBipartiteIndex([(1, 1, 0)])
        assert idx.u_vertices == [1] and idx.v_vertices == [1]
        assert idx.s_neighbors_u(1) == {1} and idx.s_neighbors_v(1) == {1}

    def test_restrict(self, small):
        out = small.restrict(
            keep_ut={(1, 0), (1, 1), (2, 1)}, keep_vt={(10, 0), (10, 1)}
        )
        assert sorted(out.edges_iter()) == [(1, 10, 0), (1, 10, 1), (2, 10, 1)]
