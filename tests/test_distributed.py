"""Distributed (Spark fan-out) enumeration ≡ sequential kernels."""
from __future__ import annotations

import pytest

from repro.core.distributed import enumerate_mfg_distributed
from repro.core.gfcore import gfcore_local
from repro.core.vfree import vfree
from repro.experiments import datasets
from repro.graph.index import TemporalBipartiteIndex
from repro.graph.schema import edges_from_pandas
from repro.synth_data import figure2_edges
from tests.conftest import FIG2_MFGS, random_temporal_graph


@pytest.mark.parametrize("algorithm", ["vfree", "filterv"])
def test_distributed_on_figure2(spark, algorithm):
    edges = edges_from_pandas(spark, figure2_edges())
    got = enumerate_mfg_distributed(edges, 2, 2, 3, algorithm=algorithm)
    assert got == FIG2_MFGS


@pytest.mark.parametrize("algorithm", ["vfree", "filterv"])
@pytest.mark.parametrize("seed", [0, 4])
def test_distributed_on_random(spark, algorithm, seed):
    g = random_temporal_graph(seed, n_u=6, n_v=8, n_t=5, density=0.45)
    edges = edges_from_pandas(spark, g.to_pandas())
    expected = vfree(gfcore_local(g, 2, 2, 2), 2, 2, 2)
    got = enumerate_mfg_distributed(edges, 2, 2, 2, algorithm=algorithm)
    assert got == expected


def test_distributed_on_dataset(spark):
    name = "D2"
    spec = datasets.SPECS[name]
    p = spec.params
    pdf = datasets.load(name, sf=0.1)
    g = TemporalBipartiteIndex.from_pandas(pdf)
    expected = vfree(
        gfcore_local(g, p.tau_u, p.tau_v, p.lam), p.tau_u, p.tau_v, p.lam
    )
    got = enumerate_mfg_distributed(
        edges_from_pandas(spark, pdf), p.tau_u, p.tau_v, p.lam
    )
    assert got == expected
    assert len(got) > 0  # planted groups guarantee non-trivial output


def test_distributed_without_graph_filter(spark):
    edges = edges_from_pandas(spark, figure2_edges())
    got = enumerate_mfg_distributed(
        edges, 2, 2, 3, apply_graph_filter=False
    )
    assert got == FIG2_MFGS


def test_distributed_empty_result(spark):
    edges = edges_from_pandas(spark, figure2_edges())
    # λ larger than |T| can never be satisfied.
    assert enumerate_mfg_distributed(edges, 2, 2, 7) == {}


def test_distributed_rejects_unknown_kernel(spark):
    edges = edges_from_pandas(spark, figure2_edges())
    with pytest.raises(ValueError):
        enumerate_mfg_distributed(edges, 2, 2, 3, algorithm="bk-alg+")
