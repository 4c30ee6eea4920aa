"""Frequency verification for candidate groups.

Two implementations, as in the paper:

- the *naive* method (§3.1 "Discussion"): for every timestamp, intersect the
  m-neighbor sets of all members and compare against ``τ_U``;
- *CheckFRE* (Algorithm 3): array-based counting over Reborn Array (RA) and
  Update Array (UA), iterating only over the edges of the common static
  neighbors ``U_S``, with early exit once ``λ`` support timestamps are found.
"""
from __future__ import annotations

from typing import Iterable, Set

import numpy as np

from repro.graph.index import TemporalBipartiteIndex


def support_timestamps(
    index: TemporalBipartiteIndex, vs: Iterable[int], tau_u: int
) -> Set[int]:
    """All support timestamps of ``V_S`` (Definition 2.4), computed naively.

    ``t`` supports ``V_S`` iff ``|⋂_{v∈V_S} Γ(v,t)| ≥ τ_U`` (the size
    constraint ``|V_S| ≥ τ_V`` is a property of the *group*, checked by the
    callers, not of the timestamp).
    """
    vs = list(vs)
    if not vs:
        return set()
    out: Set[int] = set()
    # Iterate the timestamps of the member with the fewest active snapshots.
    anchor = min(vs, key=lambda v: len(index.gamma_v.get(v, {})))
    for t, us in index.gamma_v.get(anchor, {}).items():
        if len(us) < tau_u:
            continue
        common = us
        ok = True
        for v in vs:
            if v == anchor:
                continue
            common = common & index.m_neighbors_v(v, t)
            if len(common) < tau_u:
                ok = False
                break
        if ok:
            out.add(t)
    return out


def is_frequent_naive(
    index: TemporalBipartiteIndex, vs: Iterable[int], tau_u: int, lam: int
) -> bool:
    """The paper's *naive* frequency check (§3.1 "Discussion").

    "For each timestamp t ∈ T, we check whether there exists no less than
    τ_U common m-neighbors of all the vertices in V_S" — a full scan over
    every timestamp with per-timestamp m-neighbor set intersection. This is
    deliberately the slow method that CheckFRE replaces; it is the one used
    by BK-ALG and the FilterV-VM / FilterV- ablations.
    """
    vs = list(vs)
    if not vs:
        return False
    count = 0
    for t in index.timestamps:
        # "Compute the common m-neighbors of V_S ∪ {v}" — the full
        # intersection chain, per timestamp (stopping only when it is
        # already empty), then test the τ_U threshold.
        common = None
        for v in vs:
            nbrs = index.m_neighbors_v(v, t)
            common = nbrs if common is None else common & nbrs
            if not common:
                break
        if common is not None and len(common) >= tau_u:
            count += 1
            if count >= lam:
                return True
    return False


def check_fre(
    index: TemporalBipartiteIndex,
    us: Iterable[int],
    vs: Iterable[int],
    tau_u: int,
    lam: int,
) -> bool:
    """CheckFRE (Algorithm 3) — array-based frequency verification.

    Parameters mirror the paper: ``us`` is the common s-neighbor set of all
    vertices in ``vs`` (so ``(us, vs)`` is a biclique of the static graph),
    ``vs`` the checking vertex set. Returns True iff ``vs`` has at least
    ``λ`` support timestamps.

    Semantics are exactly the paper's Reborn/Update Array counting: the RA
    slot of ``(u, t)`` reaching ``|V_S|`` means ``u`` is a common m-neighbor
    of ``V_S`` at ``t`` (one Update Array bump); a UA slot reaching ``τ_U``
    marks a support timestamp. The per-``u`` loops are vectorized across
    *all* of ``U_S`` at once: every temporal edge of every ``v ∈ V_S`` is a
    ``u·|T|+t`` key, and a key with multiplicity ``|V_S|`` is precisely an
    RA slot at ``|V_S|`` (keys of ``u ∉ U_S`` can never reach it, so the
    explicit U_S restriction is subsumed). The iteration domain — the edges
    between ``U_S`` and ``V_S`` — matches the paper's, giving the
    ``O(d_max(u)·d_max(v)·|T|)`` bound of Theorem 3.1.
    """
    vs = list(vs)
    n_t = len(index.timestamps)
    if not vs or n_t == 0:
        return False
    size = len(vs)
    if size == 1:
        # Degenerate single-member set: UA[t] = δ(v, t).
        v = vs[0]
        lam_seen = 0
        for usets in index.gamma_v.get(v, {}).values():
            if len(usets) >= tau_u:
                lam_seen += 1
                if lam_seen >= lam:
                    return True
        return False
    keys = np.concatenate([index.v_edge_keys(v) for v in vs])
    uniq, cnt = np.unique(keys, return_counts=True)
    full = uniq[cnt == size]  # (u, t) keys where RA[t] reached |V_S|
    if full.shape[0] < tau_u * lam:
        return False
    ua = np.bincount(full % n_t, minlength=n_t)  # Update Array
    return int((ua >= tau_u).sum()) >= lam


def common_s_neighbors(
    index: TemporalBipartiteIndex, vs: Iterable[int]
) -> Set[int]:
    """``U_S = ⋂_{v∈V_S} N(v, G)`` — the BK state's U side."""
    vs = list(vs)
    if not vs:
        return set(index.n_u)
    out = set(index.s_neighbors_v(vs[0]))
    for v in vs[1:]:
        out &= index.s_neighbors_v(v)
        if not out:
            break
    return out
