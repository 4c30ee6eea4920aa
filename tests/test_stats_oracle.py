"""Spark dataflow statistics checked against DuckDB via the oracle.

Every DataFrame computation in ``repro.graph.stats`` is re-expressed as
DuckDB SQL over the same edge table and the sorted rows must match.
"""
from __future__ import annotations

import pytest

from repro.experiments import datasets
from repro.graph import stats
from repro.graph.schema import edges_from_pandas, snapshot, static_edges
from repro.oracle import assert_equivalent
from repro.synth_data import figure2_edges


@pytest.fixture(scope="module")
def edge_frames(spark):
    """(name, pandas, spark) triples used across the oracle tests."""
    out = []
    for name, pdf in [
        ("fig2", figure2_edges()),
        ("d2", datasets.load("D2", sf=0.05)),
        ("d5", datasets.load("D5", sf=0.05)),
    ]:
        out.append((name, pdf, edges_from_pandas(spark, pdf)))
    return out


@pytest.mark.parametrize("which", [0, 1, 2], ids=["fig2", "d2", "d5"])
class TestDegreesAgainstDuckDB:
    def test_s_degree_u(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            stats.s_degree_u(sdf),
            "SELECT u, COUNT(DISTINCT v) AS d FROM edges GROUP BY u",
            edges=pdf,
        )

    def test_s_degree_v(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            stats.s_degree_v(sdf),
            "SELECT v, COUNT(DISTINCT u) AS d FROM edges GROUP BY v",
            edges=pdf,
        )

    def test_m_degree_u(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            stats.m_degree_u(sdf),
            "SELECT u, t, COUNT(DISTINCT v) AS d FROM edges GROUP BY u, t",
            edges=pdf,
        )

    def test_m_degree_v(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            stats.m_degree_v(sdf),
            "SELECT v, t, COUNT(DISTINCT u) AS d FROM edges GROUP BY v, t",
            edges=pdf,
        )

    def test_t_of_v(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            stats.t_of_v(sdf, 2),
            """
            SELECT v, t FROM (
              SELECT v, t, COUNT(DISTINCT u) AS d FROM edges GROUP BY v, t
            ) WHERE d >= 2
            """,
            edges=pdf,
        )

    def test_v_frequency(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            stats.v_frequency(sdf, 2),
            """
            SELECT v, COUNT(*) AS freq FROM (
              SELECT v, t, COUNT(DISTINCT u) AS d FROM edges GROUP BY v, t
            ) WHERE d >= 2 GROUP BY v
            """,
            edges=pdf,
        )

    def test_static_edges(self, edge_frames, which):
        _, pdf, sdf = edge_frames[which]
        assert_equivalent(
            static_edges(sdf),
            "SELECT DISTINCT u, v FROM edges",
            edges=pdf,
        )


def test_graph_stats_against_duckdb(spark):
    import duckdb

    pdf = figure2_edges()
    sdf = edges_from_pandas(spark, pdf)
    got = stats.graph_stats(sdf)
    con = duckdb.connect()
    con.register("edges", pdf)
    row = con.execute(
        """
        SELECT COUNT(DISTINCT u), COUNT(DISTINCT v),
               COUNT(DISTINCT (u, v, t)), COUNT(DISTINCT (u, v)),
               COUNT(DISTINCT t)
        FROM edges
        """
    ).fetchone()
    con.close()
    assert (got.n_u, got.n_v, got.n_edges, got.n_static_edges,
            got.n_timestamps) == row
    assert (got.n_u, got.n_v, got.n_timestamps) == (5, 5, 6)


def test_snapshot_projection(spark):
    pdf = figure2_edges()
    sdf = edges_from_pandas(spark, pdf)
    assert_equivalent(
        snapshot(sdf, 1),
        "SELECT DISTINCT u, v FROM edges WHERE t = 1",
        edges=pdf,
    )


def test_degree_order_is_a_permutation(spark):
    sdf = edges_from_pandas(spark, figure2_edges())
    rows = stats.degree_order_v(sdf).collect()
    assert sorted(r["new_id"] for r in rows) == list(range(5))
