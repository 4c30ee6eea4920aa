"""Experiment-harness tests (small scale): structure and the paper's
qualitative claims."""
from __future__ import annotations

import pytest

from repro.experiments import datasets
from repro.experiments.exp1 import EXP1_ALGORITHMS, format_exp1, run_exp1
from repro.experiments.table1 import (
    PAPER_TABLE1,
    PARAM_SWEEP,
    format_table1,
    run_table1,
)
from repro.experiments.table2 import format_table2, run_table2
from repro.experiments.table3 import (
    PAPER_MFG_GROUPS,
    PAPER_MSG_GROUPS,
    build_case_graph,
    format_table3,
    run_table3,
)


class TestTable1:
    @pytest.fixture(scope="class")
    def rows(self):
        # sf=0.4 is the smallest noise scale at which the FilterV-vs-VFree
        # CM gap is reliably visible (the benchmark runs at sf=1).
        return run_table1(sf=0.4)

    def test_four_parameter_columns(self, rows):
        assert [r.params for r in rows] == [
            (p.tau_u, p.tau_v, p.lam) for p in PARAM_SWEEP
        ]
        assert set(PAPER_TABLE1) == {r.params for r in rows}

    def test_algorithms_agree(self, rows):
        assert all(r.agree for r in rows)

    def test_cm_time_positive_and_bounded(self, rows):
        for r in rows:
            assert 0 < r.filterv_cm_s <= r.filterv_wall_s
            assert 0 < r.vfree_cm_s <= r.vfree_wall_s

    def test_vfree_cm_below_filterv_cm(self, rows):
        """The paper's headline: VFree's CM component is far cheaper."""
        assert sum(r.vfree_cm_s for r in rows) < sum(
            r.filterv_cm_s for r in rows
        )

    def test_format_contains_paper_values(self, rows):
        text = format_table1(rows)
        assert "88.26" in text and "899.3" in text and "63.8" in text


class TestTable2:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return run_table2(spark, sf=0.02)

    def test_all_15_datasets(self, rows):
        assert len(rows) == 15
        assert [r.name.split(" ")[0] for r in rows] == list(
            datasets.DATASET_NAMES
        )

    def test_paper_columns_carried(self, rows):
        d14 = next(r for r in rows if r.name.startswith("D14"))
        assert (d14.paper_u, d14.paper_v, d14.paper_e) == (
            8_870_763,
            757_622,
            66_586_964,
        )
        assert d14.params == (10, 6, 8)

    def test_timestamps_match_paper(self, rows):
        for r in rows:
            assert r.n_timestamps <= r.paper_t

    def test_stats_positive(self, rows):
        for r in rows:
            assert r.n_u > 0 and r.n_v > 0 and r.n_edges > 0

    def test_format(self, rows):
        text = format_table2(rows)
        assert "D15 (de)" in text and "paper |E|" in text


class TestTable3:
    @pytest.fixture(scope="class")
    def result(self):
        return run_table3()

    def test_mfg_exactly_paper_groups(self, result):
        assert sorted(result.mfg) == sorted(
            tuple(sorted(g)) for g in PAPER_MFG_GROUPS
        )

    def test_msg_contains_overmerged_clusters(self, result):
        for cluster in PAPER_MSG_GROUPS:
            assert tuple(sorted(cluster)) in result.msg

    def test_msg_groups_larger_than_mfg(self, result):
        assert max(len(g) for g in result.msg) > max(
            len(g) for g in result.mfg
        )

    def test_mfb_is_na(self, result):
        assert result.mfb == []

    def test_format(self, result):
        text = format_table3(result)
        assert "MFG" in text and "N/A" in text and "SEPSIS" in text

    def test_case_graph_deterministic(self):
        assert build_case_graph(1).equals(build_case_graph(1))


class TestExp1:
    @pytest.fixture(scope="class")
    def rows(self):
        return run_exp1(names=("D1", "D2"), sf=0.1)

    def test_all_algorithms_timed(self, rows):
        for r in rows:
            assert set(r.seconds) == set(EXP1_ALGORITHMS)
            assert all(s > 0 for s in r.seconds.values())

    def test_agreement(self, rows):
        assert all(r.agree for r in rows)
        assert all(r.n_groups > 0 for r in rows)

    def test_skipped_bk_marked_inf(self):
        rows = run_exp1(names=("D14",), sf=0.05)
        assert rows[0].seconds["bk-alg+"] == float("inf")

    def test_format(self, rows):
        text = format_exp1(rows)
        assert "vfree" in text and "D1 (MI)" in text
