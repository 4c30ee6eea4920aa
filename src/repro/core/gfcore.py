"""The (τ_V, τ_U, λ)-core graph filter (paper §3.2, Algorithm 2).

Definition 3.2: the maximal induced temporal subgraph in which

- every surviving ``(u, t)`` has m-degree ``δ(u,t) ≥ τ_V``   (u is in the
  (τ_V, τ_U)-core of snapshot ``G_t``),
- every surviving ``(v, t)`` has m-degree ``δ(v,t) ≥ τ_U``,
- every surviving ``v`` survives in at least ``λ`` snapshots (frequency),
- every surviving ``u`` survives in at least one snapshot.

The constraints are monotone under edge removal, so the maximal fixpoint is
unique and any peeling order reaches it: the paper's recursive ``CorePrune``
cascade and the synchronous peels below converge to the same subgraph. By
Lemma 3.1 every MFG vertex survives, so pruning first never loses results.

Two implementations:

- :func:`gfcore_local` — in-memory synchronous peel over the adjacency
  index (used inside search kernels and for small graphs);
- :func:`gfcore_spark` — the same peel as an iterative Spark dataflow
  (groupBy m-degrees → anti-join violators → repeat until the edge count is
  stable), for graphs that start out large.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.index import TemporalBipartiteIndex


def gfcore_local(
    index: TemporalBipartiteIndex, tau_u: int, tau_v: int, lam: int
) -> TemporalBipartiteIndex:
    """Synchronous peel to the (τ_V, τ_U, λ)-core; returns a new index.

    Vectorized over flat edge arrays: every round recomputes the
    ``(u, t)`` / ``(v, t)`` m-degrees and the per-``v`` alive-snapshot
    counts with ``np.bincount`` and drops every violating edge at once,
    until no edge is dropped (the fixpoint — same subgraph as the paper's
    recursive ``CorePrune`` cascade, see module docstring).
    """
    import numpy as np

    triples = list(index.edges_iter())
    if not triples:
        return TemporalBipartiteIndex([])
    arr = np.asarray(triples, dtype=np.int64)
    u_ids, u_code = np.unique(arr[:, 0], return_inverse=True)
    v_ids, v_code = np.unique(arr[:, 1], return_inverse=True)
    t_ids, t_code = np.unique(arr[:, 2], return_inverse=True)
    n_uu, n_vv, n_tt = len(u_ids), len(v_ids), len(t_ids)
    ut_key = u_code * n_tt + t_code
    vt_key = v_code * n_tt + t_code
    alive = np.ones(arr.shape[0], dtype=bool)
    n_alive = int(alive.sum())
    while n_alive:
        ut = ut_key[alive]
        vt = vt_key[alive]
        d_ut = np.bincount(ut, minlength=n_uu * n_tt)
        d_vt = np.bincount(vt, minlength=n_vv * n_tt)
        # Alive snapshots per v (frequency constraint).
        alive_vt = np.unique(vt)
        s_v = np.bincount(alive_vt // n_tt, minlength=n_vv)
        bad = (
            (d_ut[ut_key] < tau_v)
            | (d_vt[vt_key] < tau_u)
            | (s_v[v_code] < lam)
        ) & alive
        if not bad.any():
            break
        alive &= ~bad
        n_alive = int(alive.sum())
    return TemporalBipartiteIndex(
        map(tuple, arr[alive].tolist())
    )


def gfcore_spark(
    edges: DataFrame, tau_u: int, tau_v: int, lam: int, max_iter: int = 200
) -> DataFrame:
    """The (τ_V, τ_U, λ)-core as an iterative Spark dataflow.

    Each round removes (vertex, timestamp) pairs violating the m-degree
    constraints and whole V-vertices violating the frequency constraint,
    then repeats until the edge count is stable (the peel fixpoint).
    ``localCheckpoint`` truncates the lineage each round so the plan does
    not grow with the iteration count.
    """
    e = edges.select("u", "v", "t").distinct().localCheckpoint(eager=True)
    n = e.count()
    for _ in range(max_iter):
        if n == 0:
            break
        bad_ut = (
            e.groupBy("u", "t")
            .agg(F.count("*").alias("d"))
            .filter(F.col("d") < int(tau_v))
            .select("u", "t")
        )
        bad_vt = (
            e.groupBy("v", "t")
            .agg(F.count("*").alias("d"))
            .filter(F.col("d") < int(tau_u))
            .select("v", "t")
        )
        bad_v = (
            e.select("v", "t")
            .distinct()
            .groupBy("v")
            .agg(F.count("*").alias("s"))
            .filter(F.col("s") < int(lam))
            .select("v")
        )
        e2 = (
            e.join(bad_ut, ["u", "t"], "left_anti")
            .join(bad_vt, ["v", "t"], "left_anti")
            .join(bad_v, ["v"], "left_anti")
        ).localCheckpoint(eager=True)
        n2 = e2.count()
        e = e2
        if n2 == n:
            break
        n = n2
    return e
