"""Table 1 — FilterV vs VFree valid-candidate-set + maximality (CM) cost.

Paper Table 1 (measured on D14, >60M edges, C++): for four parameter
settings it reports the share of FilterV's runtime spent computing valid
candidate sets and verifying maximality (FilterV-CM %), the absolute time
(FilterV-CM s), and the same component's time inside VFree (VFree-CM s).

This harness reproduces the same three rows on the D14 *analogue*
(DESIGN.md §4) using the instrumented kernels (``timers["cm"]``).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

from repro.core.runner import Params, run_mfg
from repro.experiments import datasets
from repro.graph.index import TemporalBipartiteIndex

#: The paper's four (τ_U, τ_V, λ) columns.
PARAM_SWEEP: Tuple[Params, ...] = (
    Params(8, 4, 8),
    Params(9, 5, 8),
    Params(10, 6, 6),
    Params(10, 6, 10),
)

#: Paper Table 1 values: (FilterV-CM %, FilterV-CM s, VFree-CM s).
PAPER_TABLE1: Dict[Tuple[int, int, int], Tuple[float, float, float]] = {
    (8, 4, 8): (88.26, 899.30, 63.80),
    (9, 5, 8): (88.52, 702.27, 28.78),
    (10, 6, 6): (85.05, 617.14, 26.65),
    (10, 6, 10): (86.68, 248.64, 9.04),
}


@dataclass(frozen=True)
class Table1Row:
    """One parameter column of Table 1, measured on the analogue."""

    params: Tuple[int, int, int]
    filterv_cm_pct: float
    filterv_cm_s: float
    vfree_cm_s: float
    filterv_wall_s: float
    vfree_wall_s: float
    n_groups: int
    agree: bool


def run_table1(sf: float = 1.0, dataset: str = "D14") -> List[Table1Row]:
    """Measure the Table-1 rows; also cross-checks result agreement."""
    index = TemporalBipartiteIndex.from_pandas(datasets.load(dataset, sf=sf))
    rows: List[Table1Row] = []
    for params in PARAM_SWEEP:
        fv = run_mfg(index, params, "filterv")
        vf = run_mfg(index, params, "vfree")
        rows.append(
            Table1Row(
                params=(params.tau_u, params.tau_v, params.lam),
                filterv_cm_pct=fv.cm_pct,
                filterv_cm_s=fv.cm_s,
                vfree_cm_s=vf.cm_s,
                filterv_wall_s=fv.wall_s,
                vfree_wall_s=vf.wall_s,
                n_groups=fv.n_groups,
                agree=fv.groups == vf.groups,
            )
        )
    return rows


def format_table1(rows: List[Table1Row]) -> str:
    """Render measured-vs-paper rows in the paper's layout."""
    hdr = ["(tau_U,tau_V,lambda)"] + [str(r.params) for r in rows]
    lines = [" | ".join(hdr)]
    for label, meas, paper_i in [
        ("FilterV-CM (%)", [f"{r.filterv_cm_pct:.2f}%" for r in rows], 0),
        ("FilterV-CM (s)", [f"{r.filterv_cm_s:.2f}s" for r in rows], 1),
        ("VFree-CM (s)", [f"{r.vfree_cm_s:.2f}s" for r in rows], 2),
    ]:
        lines.append(" | ".join([label + " [measured]"] + meas))
        paper = [f"{PAPER_TABLE1[r.params][paper_i]}" for r in rows]
        lines.append(" | ".join([label + " [paper]   "] + paper))
    return "\n".join(lines)
