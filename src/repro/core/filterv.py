"""FilterV — the filter-and-verification framework (paper §3, Algorithm 1).

Per search node ``(U_S, V_S, C_V, X_V)``:

1. *Candidate filter* (Lemma 3.2): drop ``v' ∈ C_V`` when
   ``|⋂_{v ∈ V_S∪{v'}} T(v)| < λ`` with ``T(v) = {t : δ(v,t) ≥ τ_U}``.
2. *Valid candidate set*: keep ``v`` with ``V_S ∪ {v}`` frequent — verified
   by CheckFRE (Algorithm 3) or, for the -VM variants, the naive method.
3. Size pruning (Algorithm 1 line 10), leaf maximality via Lemma 3.3
   (``C_V* = ∅`` and no ``x ∈ X_V`` frequently extends ``V_S`` — X_V is
   first shrunk by the candidate filter, then each survivor verified).

Toggles produce the paper's ablation variants:

- ``use_candidate_filter=False``  → FilterV-FR
- ``use_array_verification=False`` → FilterV-VM
- both False                       → FilterV-

``timers`` (optional dict) accumulates the Table-1 instrumentation:
``timers["cm"]`` is the time spent computing valid candidate sets plus
verifying maximality (the paper's "FilterV-CM").
"""
from __future__ import annotations

import time
from typing import Dict, FrozenSet, List, Optional, Set

from repro.core.freq import check_fre, is_frequent_naive, support_timestamps
from repro.graph.index import TemporalBipartiteIndex


def filterv(
    index: TemporalBipartiteIndex,
    tau_u: int,
    tau_v: int,
    lam: int,
    use_candidate_filter: bool = True,
    use_array_verification: bool = True,
    timers: Optional[Dict[str, float]] = None,
    roots: Optional[List[int]] = None,
) -> Dict[FrozenSet[int], Set[int]]:
    """Enumerate all MFGs; returns ``{V_S: support timestamps}``.

    ``roots`` restricts the top level to the given first vertices (all
    other vertices still participate as candidates/X_V according to their
    position in id order) — used by the distributed fan-out.
    """
    if timers is None:
        timers = {}
    timers.setdefault("cm", 0.0)

    all_v: List[int] = sorted(index.n_v)
    all_t: FrozenSet[int] = frozenset(index.timestamps)
    # T(v) for Lemma 3.2, precomputed once.
    t_of: Dict[int, FrozenSet[int]] = {
        v: index.t_of_v(v, tau_u) for v in all_v
    }
    results: Dict[FrozenSet[int], Set[int]] = {}

    def verify(us: Set[int], new_vs: FrozenSet[int]) -> bool:
        """Frequency check for V_S ∪ {v} given its common s-neighbors."""
        if use_array_verification:
            return check_fre(index, us, new_vs, tau_u, lam)
        return is_frequent_naive(index, new_vs, tau_u, lam)

    def enum(
        us: Set[int],
        vs: FrozenSet[int],
        cand: List[int],
        xv: List[int],
        tset: FrozenSet[int],
    ) -> None:
        # ---- valid candidate set computation (timed: Table 1 "CM") ----
        t0 = time.perf_counter()
        if use_candidate_filter:
            cand = [c for c in cand if len(tset & t_of[c]) >= lam]
        cv_star: List[int] = []
        star_us: Dict[int, Set[int]] = {}
        for v in cand:
            nus = us & index.s_neighbors_v(v)
            if len(nus) >= tau_u and verify(nus, vs | {v}):
                cv_star.append(v)
                star_us[v] = nus
        timers["cm"] += time.perf_counter() - t0

        if len(us) < tau_u or len(vs) + len(cv_star) < tau_v:
            return
        if not cv_star:
            # ---- maximality verification (timed: Table 1 "CM") ----
            t0 = time.perf_counter()
            maximal = True
            for x in xv:
                if x in vs:
                    continue
                if use_candidate_filter and len(tset & t_of[x]) < lam:
                    continue
                nus = us & index.s_neighbors_v(x)
                if len(nus) >= tau_u and verify(nus, vs | {x}):
                    maximal = False
                    break
            timers["cm"] += time.perf_counter() - t0
            if maximal and len(vs) >= tau_v:
                results[vs] = support_timestamps(index, vs, tau_u)
            return
        rest = list(cv_star)
        child_xv = list(xv)
        for v in cv_star:
            rest.remove(v)
            enum(star_us[v], vs | {v}, list(rest), child_xv, tset & t_of[v])
            child_xv.append(v)

    all_u: Set[int] = set(index.n_u)
    if roots is None:
        enum(all_u, frozenset(), all_v, [], all_t)
    else:
        # Rooted execution: branch for root r covers MFGs whose minimum id
        # is r; earlier vertices act as X_V, later ones as candidates.
        for r in roots:
            pos = all_v.index(r)
            nus = all_u & index.s_neighbors_v(r)
            if len(nus) < tau_u:
                continue
            if not verify(nus, frozenset([r])):
                continue
            enum(
                nus,
                frozenset([r]),
                all_v[pos + 1 :],
                list(all_v[:pos]),
                all_t & t_of[r],
            )
    return results
