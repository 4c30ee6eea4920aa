"""MFB and MSG comparator-model tests."""
from __future__ import annotations

import pytest

from repro.graph.index import TemporalBipartiteIndex
from repro.models.mfb import mfb
from repro.models.msg import msg
from repro.synth_data import planted_mfg


class TestMSG:
    def test_figure2_static_graph_is_one_big_group(self, fig2):
        # Figure-1 discussion: ignoring time, everything merges.
        assert [sorted(s) for s in msg(fig2, 2, 2)] == [[1, 2, 3, 4, 5]]

    def test_msg_respects_size_constraints(self, fig2):
        # τ_U = 6 > |U| = 5: nothing can qualify.
        assert msg(fig2, 6, 2) == []

    def test_msg_equals_mfg_with_lambda_one_on_static(self):
        from repro.core.vfree import vfree

        idx = TemporalBipartiteIndex(
            [(1, 1, 0), (1, 2, 3), (2, 1, 5), (2, 2, 7), (3, 3, 5)]
        )
        static = TemporalBipartiteIndex(
            (u, v, 0) for (u, v, _t) in {(u, v, 0) for u, v, _ in idx.edges_iter()}
        )
        assert set(msg(idx, 2, 2)) == set(vfree(static, 2, 2, 1))


class TestMFB:
    def test_figure2_has_no_frequent_biclique(self, fig2):
        # Paper Table 3 intuition: requiring the same U side to repeat is
        # very strict; on Figure 2 nothing survives (2,2,3).
        assert mfb(fig2, 2, 2, 3) == []

    def test_recovers_planted_fixed_biclique(self):
        pdf = planted_mfg(
            members_v=[1, 2, 3],
            group_u_size=2,
            timestamps=[0, 1, 2, 3],
            u_id_start=100,
            fresh_u_per_t=False,
        )
        got = mfb(TemporalBipartiteIndex.from_pandas(pdf), 2, 2, 3)
        assert got == [(frozenset({100, 101}), frozenset({1, 2, 3}))]

    def test_fresh_u_defeats_mfb(self):
        pdf = planted_mfg(
            members_v=[1, 2, 3],
            group_u_size=2,
            timestamps=[0, 1, 2, 3],
            u_id_start=100,
            fresh_u_per_t=True,
        )
        assert mfb(TemporalBipartiteIndex.from_pandas(pdf), 2, 2, 3) == []

    def test_frequency_threshold(self):
        pdf = planted_mfg(
            members_v=[1, 2],
            group_u_size=2,
            timestamps=[0, 1, 2],
            u_id_start=10,
            fresh_u_per_t=False,
        )
        idx = TemporalBipartiteIndex.from_pandas(pdf)
        assert mfb(idx, 2, 2, 3) != []
        assert mfb(idx, 2, 2, 4) == []

    def test_maximality_across_pairs(self):
        # A 3x3 biclique at 3 timestamps: the maximal pair is the full one.
        pdf = planted_mfg(
            members_v=[1, 2, 3],
            group_u_size=3,
            timestamps=[0, 1, 2],
            u_id_start=10,
            fresh_u_per_t=False,
        )
        got = mfb(TemporalBipartiteIndex.from_pandas(pdf), 2, 2, 3)
        assert got == [(frozenset({10, 11, 12}), frozenset({1, 2, 3}))]

    def test_size_constraints(self):
        pdf = planted_mfg(
            members_v=[1, 2],
            group_u_size=2,
            timestamps=[0, 1, 2],
            u_id_start=10,
            fresh_u_per_t=False,
        )
        idx = TemporalBipartiteIndex.from_pandas(pdf)
        assert mfb(idx, 3, 2, 3) == []  # needs 3 U vertices, only 2 exist
        assert mfb(idx, 2, 3, 3) == []  # needs 3 V vertices, only 2 exist
