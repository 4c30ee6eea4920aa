"""Driver-side compact adjacency index for temporal bipartite graphs.

The enumeration kernels (BK-ALG, FilterV, VFree) are recursive depth-first
searches; they run on one worker (or the driver) over a pruned subgraph, so
they need O(1) m-neighbor / s-neighbor lookups. This module provides that
index, built from a pandas edge frame (``u, v, t`` columns).

U-ids and V-ids are separate namespaces, mirroring the paper's disjoint
vertex sets U and V.
"""
from __future__ import annotations

from typing import Dict, FrozenSet, Iterable, List, Set, Tuple

import numpy as np
import pandas as pd


class TemporalBipartiteIndex:
    """Adjacency index over a temporal bipartite graph.

    Attributes
    ----------
    timestamps : tuple of int — sorted distinct timestamps ``T``.
    t_pos : dict — timestamp -> dense position ``0..|T|-1`` (array slots for
        CheckFRE's Reborn/Update arrays and VFree's counting structures).
    gamma_v / gamma_u : dict — per-timestamp m-neighbor sets
        ``gamma_v[v][t] = Γ(v,t) ⊆ U`` and ``gamma_u[u][t] = Γ(u,t) ⊆ V``.
    n_v / n_u : dict — static s-neighbor sets ``N(v) ⊆ U``, ``N(u) ⊆ V``.
    edge_ts : dict — ``(u, v) -> np.ndarray`` of dense timestamp positions
        ``T_(u,v)`` (paper Algorithm 3 line 6).
    """

    __slots__ = (
        "timestamps",
        "t_pos",
        "gamma_v",
        "gamma_u",
        "n_v",
        "n_u",
        "edge_ts",
        "n_edges",
        "_v_keys",
    )

    def __init__(self, edges: Iterable[Tuple[int, int, int]]):
        gamma_v: Dict[int, Dict[int, Set[int]]] = {}
        gamma_u: Dict[int, Dict[int, Set[int]]] = {}
        n_v: Dict[int, Set[int]] = {}
        n_u: Dict[int, Set[int]] = {}
        raw_edge_ts: Dict[Tuple[int, int], Set[int]] = {}
        ts: Set[int] = set()
        n_edges = 0
        seen: Set[Tuple[int, int, int]] = set()
        for u, v, t in edges:
            u, v, t = int(u), int(v), int(t)
            if (u, v, t) in seen:
                continue
            seen.add((u, v, t))
            n_edges += 1
            ts.add(t)
            gamma_v.setdefault(v, {}).setdefault(t, set()).add(u)
            gamma_u.setdefault(u, {}).setdefault(t, set()).add(v)
            n_v.setdefault(v, set()).add(u)
            n_u.setdefault(u, set()).add(v)
            raw_edge_ts.setdefault((u, v), set()).add(t)
        self.timestamps: Tuple[int, ...] = tuple(sorted(ts))
        self.t_pos: Dict[int, int] = {t: i for i, t in enumerate(self.timestamps)}
        self.gamma_v = gamma_v
        self.gamma_u = gamma_u
        self.n_v = n_v
        self.n_u = n_u
        self.edge_ts: Dict[Tuple[int, int], np.ndarray] = {
            e: np.fromiter(
                sorted(self.t_pos[t] for t in tset), dtype=np.int64, count=len(tset)
            )
            for e, tset in raw_edge_ts.items()
        }
        self.n_edges = n_edges
        # Lazy cache: per-v flattened (u, t)-key arrays for CheckFRE.
        self._v_keys: Dict[int, np.ndarray] = {}

    # ------------------------------------------------------------------
    # Constructors
    # ------------------------------------------------------------------
    @classmethod
    def from_pandas(cls, pdf: pd.DataFrame) -> "TemporalBipartiteIndex":
        """Build from a pandas frame with ``u, v, t`` columns."""
        return cls(
            zip(
                pdf["u"].to_numpy().tolist(),
                pdf["v"].to_numpy().tolist(),
                pdf["t"].to_numpy().tolist(),
            )
        )

    @classmethod
    def from_spark(cls, edges) -> "TemporalBipartiteIndex":
        """Collect a (pruned, small) Spark edge DataFrame into an index."""
        return cls.from_pandas(edges.select("u", "v", "t").toPandas())

    # ------------------------------------------------------------------
    # Basic accessors (paper Definitions 2.1 / 2.2)
    # ------------------------------------------------------------------
    @property
    def u_vertices(self) -> List[int]:
        """All U-side vertices with at least one edge."""
        return sorted(self.n_u)

    @property
    def v_vertices(self) -> List[int]:
        """All V-side vertices with at least one edge."""
        return sorted(self.n_v)

    def s_neighbors_v(self, v: int) -> Set[int]:
        """``N(v, G)`` — static neighbors of ``v`` in U."""
        return self.n_v.get(v, set())

    def s_neighbors_u(self, u: int) -> Set[int]:
        """``N(u, G)`` — static neighbors of ``u`` in V."""
        return self.n_u.get(u, set())

    def m_neighbors_v(self, v: int, t: int) -> Set[int]:
        """``Γ(v, t)`` — m-neighbors of ``v`` at timestamp ``t``."""
        return self.gamma_v.get(v, {}).get(t, set())

    def m_neighbors_u(self, u: int, t: int) -> Set[int]:
        """``Γ(u, t)`` — m-neighbors of ``u`` at timestamp ``t``."""
        return self.gamma_u.get(u, {}).get(t, set())

    def m_degree_v(self, v: int, t: int) -> int:
        """``δ(v, t)``."""
        return len(self.m_neighbors_v(v, t))

    def m_degree_u(self, u: int, t: int) -> int:
        """``δ(u, t)``."""
        return len(self.m_neighbors_u(u, t))

    # ------------------------------------------------------------------
    # Derived sets used by the filtering rules
    # ------------------------------------------------------------------
    def t_of_v(self, v: int, tau_u: int) -> FrozenSet[int]:
        """``T(v) = {t : δ(v,t) ≥ τ_U}`` (paper Lemma 3.2)."""
        return frozenset(
            t for t, us in self.gamma_v.get(v, {}).items() if len(us) >= tau_u
        )

    def v_edge_keys(self, v: int) -> np.ndarray:
        """All temporal edges of ``v`` flattened to ``u·|T| + t_pos`` keys.

        Cached per vertex; the CheckFRE verification (Algorithm 3) counts
        how many members of ``V_S`` each ``(u, t)`` key covers — a key hit
        ``|V_S|`` times is a common m-neighbor occurrence (a Reborn-Array
        slot reaching ``|V_S|``).
        """
        arr = self._v_keys.get(v)
        if arr is None:
            n_t = len(self.timestamps)
            keys = [
                u * n_t + self.t_pos[t]
                for t, us in self.gamma_v.get(v, {}).items()
                for u in us
            ]
            arr = np.asarray(sorted(keys), dtype=np.int64)
            self._v_keys[v] = arr
        return arr

    def edges_iter(self) -> Iterable[Tuple[int, int, int]]:
        """Iterate all distinct ``(u, v, t)`` temporal edges."""
        for u, per_t in self.gamma_u.items():
            for t, vs in per_t.items():
                for v in vs:
                    yield (u, v, t)

    def to_pandas(self) -> pd.DataFrame:
        """Materialize back to a pandas edge frame (sorted, deterministic)."""
        rows = sorted(self.edges_iter())
        return pd.DataFrame(rows, columns=["u", "v", "t"], dtype="int64")

    def restrict(
        self, keep_ut: Set[Tuple[int, int]], keep_vt: Set[Tuple[int, int]]
    ) -> "TemporalBipartiteIndex":
        """Induced sub-index keeping edge ``(u,v,t)`` iff both ``(u,t)`` and
        ``(v,t)`` survive — used by the GFCore peel."""
        return TemporalBipartiteIndex(
            (u, v, t)
            for (u, v, t) in self.edges_iter()
            if (u, t) in keep_ut and (v, t) in keep_vt
        )

    def __len__(self) -> int:
        return self.n_edges

    def __repr__(self) -> str:  # pragma: no cover - debug helper
        return (
            f"TemporalBipartiteIndex(|U|={len(self.n_u)}, |V|={len(self.n_v)}, "
            f"|E|={self.n_edges}, |T|={len(self.timestamps)})"
        )
