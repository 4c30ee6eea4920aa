"""Exponential reference oracle for MFG enumeration.

Enumerates every subset of V (so only usable for ``|V| ≲ 16``), computes its
support-timestamp count naively, and keeps the maximal frequent groups. The
production algorithms (BK-ALG, FilterV, VFree) are all tested against this.
"""
from __future__ import annotations

from itertools import combinations
from typing import Dict, FrozenSet, List, Set

from repro.core.freq import support_timestamps
from repro.graph.index import TemporalBipartiteIndex


def enumerate_mfg_bruteforce(
    index: TemporalBipartiteIndex,
    tau_u: int,
    tau_v: int,
    lam: int,
    max_v: int = 18,
) -> Dict[FrozenSet[int], Set[int]]:
    """All MFGs mapped to their support-timestamp sets.

    Raises ``ValueError`` when |V| exceeds ``max_v`` (the search is 2^|V|).
    """
    vees: List[int] = sorted(index.n_v)
    if len(vees) > max_v:
        raise ValueError(
            f"brute force limited to |V| <= {max_v}, got {len(vees)}"
        )
    frequent: Dict[FrozenSet[int], Set[int]] = {}
    for size in range(tau_v, len(vees) + 1):
        for combo in combinations(vees, size):
            supp = support_timestamps(index, combo, tau_u)
            if len(supp) >= lam:
                frequent[frozenset(combo)] = supp
    # Maximality: drop any frequent set with a frequent strict superset.
    # (Supersets of a non-frequent set are non-frequent — Lemma 2.2 — but we
    # enumerated everything anyway, so a direct filter is simplest.)
    out: Dict[FrozenSet[int], Set[int]] = {}
    for vs, supp in frequent.items():
        if not any(vs < other for other in frequent):
            out[vs] = supp
    return out
