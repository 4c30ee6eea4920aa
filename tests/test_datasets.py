"""Dataset-analogue tests: spec sanity for all 15, planted-group recovery,
cross-algorithm agreement at test scale."""
from __future__ import annotations

import pytest

from repro.core.gfcore import gfcore_local
from repro.core.runner import run_mfg
from repro.core.vfree import vfree
from repro.experiments import datasets
from repro.graph.index import TemporalBipartiteIndex

ALL = list(datasets.DATASET_NAMES)
SMALL = ["D1", "D2", "D3", "D5"]  # cheap enough to enumerate in tests


@pytest.mark.parametrize("name", ALL)
class TestSpecs:
    def test_spec_matches_paper_timestamps(self, name):
        spec = datasets.SPECS[name]
        assert spec.n_ts >= 12
        assert spec.params.tau_u >= 1

    def test_generation_deterministic(self, name):
        a = datasets.load(name, sf=0.02)
        b = datasets.load(name, sf=0.02)
        assert a.equals(b)

    def test_generated_shape(self, name):
        pdf = datasets.load(name, sf=0.02)
        assert set(pdf.columns) == {"u", "v", "t"}
        assert pdf["t"].nunique() <= datasets.SPECS[name].n_ts
        assert not pdf.duplicated().any()


@pytest.mark.parametrize("name", SMALL)
class TestRecovery:
    def test_planted_groups_recovered(self, name):
        spec = datasets.SPECS[name]
        idx = TemporalBipartiteIndex.from_pandas(datasets.load(name, sf=0.05))
        res = run_mfg(idx, spec.params, "vfree").groups
        for members in datasets.planted_groups_v(spec, 0.05):
            assert any(set(members) <= vs for vs in res), members

    def test_gfcore_keeps_planted_vertices(self, name):
        spec = datasets.SPECS[name]
        p = spec.params
        idx = TemporalBipartiteIndex.from_pandas(datasets.load(name, sf=0.05))
        core = gfcore_local(idx, p.tau_u, p.tau_v, p.lam)
        surviving = set(core.n_v)
        for members in datasets.planted_groups_v(spec, 0.05):
            assert set(members) <= surviving

    def test_all_algorithms_agree(self, name):
        spec = datasets.SPECS[name]
        idx = TemporalBipartiteIndex.from_pandas(datasets.load(name, sf=0.05))
        ref = run_mfg(idx, spec.params, "vfree").groups
        for alg in ("filterv", "filterv-", "bk-alg+", "vfree-"):
            assert run_mfg(idx, spec.params, alg).groups == ref, alg


def test_pruning_is_substantial():
    """The (τ_V,τ_U,λ)-core removes a large share of the noise (the paper
    reports >90% on real data; the analogues keep a dense surviving
    residue by design, so the bar here is lower)."""
    spec = datasets.SPECS["D14"]
    idx = TemporalBipartiteIndex.from_pandas(datasets.load("D14", sf=0.3))
    p = spec.params
    core = gfcore_local(idx, p.tau_u, p.tau_v, p.lam)
    assert len(core) < 0.7 * len(idx)


def test_bigger_sf_means_more_edges():
    a = len(datasets.load("D5", sf=0.05))
    b = len(datasets.load("D5", sf=0.2))
    assert b > a


def test_planted_group_ids_disjoint_from_noise():
    spec = datasets.SPECS["D5"]
    groups = datasets.planted_groups_v(spec, 0.05)
    flat = [v for g in groups for v in g]
    assert len(set(flat)) == len(flat)
    assert min(flat) > int(spec.n_v * 0.05)
