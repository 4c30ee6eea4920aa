"""MFB — maximal frequent (τ_U, τ_V)-biclique (paper §5.2 comparator).

A pair ``(U_S, V_S)`` with ``|U_S| ≥ τ_U`` and ``|V_S| ≥ τ_V`` whose *whole
biclique* appears (every edge present) in at least ``λ`` snapshots, such
that no strict super-pair is also frequent. Unlike MFG, the same U side
must repeat across the λ snapshots — the paper's case studies show this is
usually too strict to return anything.

Implementation: per-edge timestamp bitmasks. An edge of a frequent biclique
must itself appear in ≥ λ snapshots, so static edges with ``|T_(u,v)| < λ``
are peeled first (with the induced degree cascade). The search then runs an
ordered DFS over the V side (extend while ≥ τ_U U-candidates remain) and,
per V_S, a second DFS over U-candidates whose shared-timestamp mask keeps
``popcount ≥ λ``; global pairwise containment filtering yields the maximal
pairs. Exponential in the worst case — intended for the case-study scale,
guarded by ``max_nodes``.
"""
from __future__ import annotations

from typing import Dict, FrozenSet, List, Set, Tuple

from repro.graph.index import TemporalBipartiteIndex

Pair = Tuple[FrozenSet[int], FrozenSet[int]]


def _edge_masks(
    index: TemporalBipartiteIndex, lam: int
) -> Dict[Tuple[int, int], int]:
    """Static-edge timestamp bitmasks, peeled to the (λ, τ-free) skeleton."""
    masks = {
        (u, v): int(sum(1 << int(p) for p in ts))
        for (u, v), ts in index.edge_ts.items()
        if len(ts) >= lam
    }
    return masks


def mfb(
    index: TemporalBipartiteIndex,
    tau_u: int,
    tau_v: int,
    lam: int,
    max_nodes: int = 200_000,
) -> List[Pair]:
    """All maximal frequent (τ_U, τ_V)-bicliques as ``(U_S, V_S)`` pairs."""
    masks = _edge_masks(index, lam)
    # Degree peel on the surviving static skeleton.
    while True:
        n_u: Dict[int, Set[int]] = {}
        n_v: Dict[int, Set[int]] = {}
        for (u, v) in masks:
            n_u.setdefault(u, set()).add(v)
            n_v.setdefault(v, set()).add(u)
        drop = {
            (u, v)
            for (u, v) in masks
            if len(n_u[u]) < tau_v or len(n_v[v]) < tau_u
        }
        if not drop:
            break
        for e in drop:
            del masks[e]
    if not masks:
        return []
    adj_v: Dict[int, Set[int]] = {}
    for (u, v) in masks:
        adj_v.setdefault(v, set()).add(u)
    vees = sorted(adj_v)
    pairs: List[Pair] = []
    budget = [max_nodes]

    def popcount_ok(mask: int) -> bool:
        return mask.bit_count() >= lam

    def enum_u_side(vs: FrozenSet[int], ucand: List[int], umask: Dict[int, int]) -> None:
        """Maximal U_S ⊆ ucand with shared mask popcount ≥ λ, |U_S| ≥ τ_U."""

        def rec_u(us: List[int], mask: int, cand: List[int]) -> None:
            if budget[0] <= 0:
                raise RuntimeError("mfb search budget exhausted")
            budget[0] -= 1
            extended = False
            for i, u in enumerate(cand):
                m2 = mask & umask[u]
                if popcount_ok(m2):
                    extended = True
                    rec_u(us + [u], m2, cand[i + 1 :])
            if extended or len(us) < tau_u:
                return
            # Maximal within this V_S iff no u ∈ ucand (also earlier ones)
            # can join while keeping the mask frequent.
            us_set = set(us)
            for u in ucand:
                if u not in us_set and popcount_ok(mask & umask[u]):
                    return
            pairs.append((frozenset(us), vs))

        rec_u([], (1 << len(index.timestamps)) - 1, ucand)

    def rec_v(vs: List[int], cand: List[int]) -> None:
        if budget[0] <= 0:
            raise RuntimeError("mfb search budget exhausted")
        budget[0] -= 1
        if len(vs) >= tau_v:
            fvs = frozenset(vs)
            ucand = sorted(set.intersection(*(adj_v[v] for v in vs)))
            umask = {
                u: _and_masks(masks, u, vs) for u in ucand
            }
            ucand = [u for u in ucand if popcount_ok(umask[u])]
            if len(ucand) >= tau_u:
                enum_u_side(fvs, ucand, umask)
        for i, v in enumerate(cand):
            common = set.intersection(*(adj_v[x] for x in vs + [v])) if vs else adj_v[v]
            if len(common) >= tau_u:
                rec_v(vs + [v], cand[i + 1 :])

    def _and_masks(m: Dict[Tuple[int, int], int], u: int, vs: List[int]) -> int:
        out = (1 << len(index.timestamps)) - 1
        for v in vs:
            out &= m.get((u, v), 0)
        return out

    rec_v([], vees)
    # Global maximality: drop pairs contained in another pair.
    out: List[Pair] = []
    for us, vs in pairs:
        dominated = any(
            (us2, vs2) != (us, vs) and us <= us2 and vs <= vs2
            for us2, vs2 in pairs
        )
        if not dominated:
            out.append((us, vs))
    return sorted(set(out), key=lambda p: (sorted(p[1]), sorted(p[0])))
