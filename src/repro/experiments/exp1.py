"""Exp-1 — response time of the four evaluated algorithms per dataset.

Figure 5 of the paper (a figure, so out of the must-reproduce scope, but it
carries the headline claim): on every dataset the ordering is

    VFree  <  FilterV  <  FilterV-  <  BK-ALG+,

with BK-ALG+ hitting the 12-hour wall (INF) on the larger graphs and VFree
up to three orders of magnitude faster where BK-ALG+ finishes.

This harness measures the same four algorithms on the dataset analogues.
BK-ALG+ is only run on datasets where it is known to terminate quickly
(mirroring the paper, which reports INF for BK-ALG+ on most large
datasets); elsewhere it is reported as ``inf``.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

from repro.core.runner import run_mfg
from repro.experiments import datasets
from repro.graph.index import TemporalBipartiteIndex

#: Algorithms in the paper's Figure-5 order.
EXP1_ALGORITHMS: Tuple[str, ...] = ("bk-alg+", "filterv-", "filterv", "vfree")

#: Analogue datasets where BK-ALG+ is allowed to run (the paper's BK-ALG+
#: completes on the small/medium graphs and is INF on the big ones).
BK_DATASETS: Tuple[str, ...] = ("D1", "D2", "D3", "D5", "D6", "D9")


@dataclass(frozen=True)
class Exp1Row:
    """Wall-clock seconds per algorithm on one dataset (inf = skipped)."""

    dataset: str
    seconds: Dict[str, float]
    n_groups: int
    agree: bool


def run_exp1(
    names: Tuple[str, ...] = ("D1", "D2", "D5", "D9", "D14", "D15"),
    sf: float = 1.0,
) -> List[Exp1Row]:
    """Measure response times; cross-checks that all algorithms agree."""
    rows: List[Exp1Row] = []
    for name in names:
        spec = datasets.SPECS[name]
        index = TemporalBipartiteIndex.from_pandas(datasets.load(name, sf=sf))
        secs: Dict[str, float] = {}
        ref = None
        agree = True
        for alg in EXP1_ALGORITHMS:
            if alg == "bk-alg+" and name not in BK_DATASETS:
                secs[alg] = float("inf")
                continue
            run = run_mfg(index, spec.params, alg)
            secs[alg] = run.wall_s
            if ref is None:
                ref = run.groups
            agree = agree and run.groups == ref
        rows.append(
            Exp1Row(
                dataset=spec.name,
                seconds=secs,
                n_groups=len(ref) if ref is not None else 0,
                agree=agree,
            )
        )
    return rows


def format_exp1(rows: List[Exp1Row]) -> str:
    """Render the response-time matrix."""
    lines = [
        f"{'Dataset':10s} " + " ".join(f"{a:>10s}" for a in EXP1_ALGORITHMS)
        + f" {'#MFG':>6s}"
    ]
    for r in rows:
        cells = " ".join(
            f"{r.seconds[a]:>9.3f}s" if r.seconds[a] != float("inf") else f"{'INF':>10s}"
            for a in EXP1_ALGORITHMS
        )
        lines.append(f"{r.dataset:10s} {cells} {r.n_groups:>6d}")
    return "\n".join(lines)
