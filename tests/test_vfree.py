"""VFree-specific behavior: rooted partitioning, order handling, timers."""
from __future__ import annotations

import pytest

from repro.core.vfree import degree_order, vfree
from tests.conftest import FIG2_MFGS, random_temporal_graph


class TestRootedPartition:
    """Theorem 4.1's branch independence: the branch rooted at ``r`` emits
    exactly the MFGs whose minimum-rank member is ``r``, so the rooted runs
    partition the full result."""

    @pytest.mark.parametrize("seed", range(8))
    def test_union_of_roots_equals_full(self, seed):
        g = random_temporal_graph(seed)
        full = vfree(g, 2, 2, 2, reorder_ids=False)
        merged = {}
        for r in sorted(g.n_v):
            part = vfree(g, 2, 2, 2, reorder_ids=False, roots=[r])
            for vs, supp in part.items():
                assert vs not in merged, "duplicate MFG across roots"
                merged[vs] = supp
        assert merged == full

    def test_root_branch_contains_min_member(self, fig2):
        for r in sorted(fig2.n_v):
            part = vfree(fig2, 2, 2, 3, reorder_ids=False, roots=[r])
            for vs in part:
                assert min(vs) == r

    def test_roots_with_unknown_vertex_ignored(self, fig2):
        assert vfree(fig2, 2, 2, 3, reorder_ids=False, roots=[999]) == {}


class TestOrdering:
    def test_degree_order_ranks(self, fig2):
        order = degree_order(fig2)
        assert sorted(order.values()) == list(range(len(fig2.n_v)))
        degs = [len(fig2.n_v[v]) for v in sorted(order, key=order.get)]
        assert degs == sorted(degs)

    def test_explicit_order_any_permutation_is_correct(self, fig2):
        """§4.2: correctness holds for *any* id assignment."""
        vees = sorted(fig2.n_v)
        for shift in range(len(vees)):
            perm = {v: (i + shift) % len(vees) for i, v in enumerate(vees)}
            assert vfree(fig2, 2, 2, 3, order=perm) == FIG2_MFGS

    @pytest.mark.parametrize("seed", range(6))
    def test_reorder_does_not_change_results(self, seed):
        g = random_temporal_graph(seed)
        assert vfree(g, 2, 2, 2) == vfree(g, 2, 2, 2, reorder_ids=False)


class TestInstrumentation:
    def test_cm_timer_populated(self, fig2):
        timers = {}
        vfree(fig2, 2, 2, 3, timers=timers)
        assert 0 < timers["cm"]

    def test_empty_graph_returns_empty(self):
        from repro.graph.index import TemporalBipartiteIndex

        assert vfree(TemporalBipartiteIndex([]), 1, 1, 1) == {}

    def test_tau_v_one_reports_frequent_singletons(self, fig2):
        # With τ_V = 1, {v3} (δ ≥ 2 at t1..t6 minus...) must satisfy λ.
        res = vfree(fig2, 2, 1, 3)
        # every reported group is frequent and maximal; singletons allowed
        assert all(len(vs) >= 1 for vs in res)
        from repro.core.bruteforce import enumerate_mfg_bruteforce

        assert res == enumerate_mfg_bruteforce(fig2, 2, 1, 3)
