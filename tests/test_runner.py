"""Unified runner API tests."""
from __future__ import annotations

import pytest

from repro.core.runner import ALGORITHMS, MFGRun, Params, run_mfg
from tests.conftest import FIG2_MFGS


def test_params_validation():
    with pytest.raises(ValueError):
        Params(0, 1, 1)
    with pytest.raises(ValueError):
        Params(1, 1, -2)
    assert Params(2, 3, 4).lam == 4


@pytest.mark.parametrize("alg", ALGORITHMS)
def test_runner_all_algorithms(fig2, alg):
    run = run_mfg(fig2, Params(2, 2, 3), alg)
    assert isinstance(run, MFGRun)
    assert run.groups == FIG2_MFGS
    assert run.wall_s > 0
    assert run.n_groups == 3


def test_runner_rejects_unknown_algorithm(fig2):
    with pytest.raises(ValueError):
        run_mfg(fig2, Params(2, 2, 3), "quantum")


def test_graph_filter_applied_except_for_vfree_minus(fig2):
    run = run_mfg(fig2, Params(2, 2, 3), "vfree")
    run_nf = run_mfg(fig2, Params(2, 2, 3), "vfree-")
    assert run.filtered_edges <= run.input_edges
    assert run_nf.filtered_edges == run_nf.input_edges


def test_cm_share_bounded(fig2):
    run = run_mfg(fig2, Params(2, 2, 3), "filterv")
    assert 0 <= run.cm_pct <= 100
    assert run.cm_s <= run.wall_s
