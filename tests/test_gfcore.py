"""(τ_V, τ_U, λ)-core tests: peel invariants, Lemma 3.1, and the Spark
dataflow ≡ local peel equivalence."""
from __future__ import annotations

import pytest

from repro.core.bruteforce import enumerate_mfg_bruteforce
from repro.core.gfcore import gfcore_local, gfcore_spark
from repro.core.vfree import vfree
from repro.graph.schema import edges_from_pandas
from repro.synth_data import figure2_edges
from tests.conftest import random_temporal_graph


class TestLocalPeel:
    @pytest.mark.parametrize("seed", range(15))
    @pytest.mark.parametrize("params", [(1, 1, 1), (2, 2, 2), (2, 1, 3), (3, 2, 2)])
    def test_core_satisfies_constraints(self, seed, params):
        tau_u, tau_v, lam = params
        core = gfcore_local(random_temporal_graph(seed), tau_u, tau_v, lam)
        for u, per_t in core.gamma_u.items():
            for t, vs in per_t.items():
                assert len(vs) >= tau_v, (u, t)
        for v, per_t in core.gamma_v.items():
            assert len(per_t) >= lam, v
            for t, us in per_t.items():
                assert len(us) >= tau_u, (v, t)

    @pytest.mark.parametrize("seed", range(15))
    def test_core_is_fixpoint(self, seed):
        g = random_temporal_graph(seed)
        core = gfcore_local(g, 2, 2, 2)
        again = gfcore_local(core, 2, 2, 2)
        assert sorted(again.edges_iter()) == sorted(core.edges_iter())

    @pytest.mark.parametrize("seed", range(15))
    @pytest.mark.parametrize("params", [(1, 1, 2), (2, 2, 2), (2, 1, 3)])
    def test_lemma_3_1_no_mfg_vertex_pruned(self, seed, params):
        """Filtering first never changes the enumeration result."""
        tau_u, tau_v, lam = params
        g = random_temporal_graph(seed)
        expected = enumerate_mfg_bruteforce(g, tau_u, tau_v, lam)
        core = gfcore_local(g, tau_u, tau_v, lam)
        assert vfree(core, tau_u, tau_v, lam) == expected

    def test_monotone_in_parameters(self):
        g = random_temporal_graph(3, n_u=8, n_v=8, n_t=6, density=0.5)
        sizes = [
            len(gfcore_local(g, tau_u, 2, 2)) for tau_u in (1, 2, 3, 4)
        ]
        assert sizes == sorted(sizes, reverse=True)

    def test_empty_graph(self):
        from repro.graph.index import TemporalBipartiteIndex

        assert len(gfcore_local(TemporalBipartiteIndex([]), 2, 2, 2)) == 0

    def test_figure2_core_keeps_mfg_vertices(self, fig2):
        core = gfcore_local(fig2, 2, 2, 3)
        surviving_v = set(core.n_v)
        for vs in ({1, 2, 3, 5}, {2, 3, 4}, {3, 4, 5}):
            assert vs <= surviving_v


class TestSparkPeel:
    @pytest.mark.parametrize("params", [(2, 2, 3), (1, 1, 1), (3, 3, 2)])
    def test_spark_equals_local_on_figure2(self, spark, fig2, params):
        tau_u, tau_v, lam = params
        edges = edges_from_pandas(spark, figure2_edges())
        got = sorted(
            map(
                tuple,
                gfcore_spark(edges, tau_u, tau_v, lam)
                .toPandas()[["u", "v", "t"]]
                .itertuples(index=False),
            )
        )
        expected = sorted(gfcore_local(fig2, tau_u, tau_v, lam).edges_iter())
        assert got == expected

    @pytest.mark.parametrize("seed", [0, 1])
    def test_spark_equals_local_on_random(self, spark, seed):
        g = random_temporal_graph(seed, n_u=8, n_v=8, n_t=6, density=0.5)
        edges = edges_from_pandas(spark, g.to_pandas())
        got = sorted(
            map(
                tuple,
                gfcore_spark(edges, 2, 2, 2)
                .toPandas()[["u", "v", "t"]]
                .itertuples(index=False),
            )
        )
        expected = sorted(gfcore_local(g, 2, 2, 2).edges_iter())
        assert got == expected
