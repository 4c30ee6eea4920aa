"""Experiment harnesses reproducing the paper's evaluation tables.

- ``datasets`` — the 15 synthetic analogues of the paper's Table-2 datasets.
- ``table1`` — FilterV vs VFree candidate-set + maximality (CM) cost.
- ``table2`` — dataset statistics.
- ``table3`` — D1 case study: MFG vs MSG vs MFB.
- ``exp1``  — response-time ordering of the four evaluated algorithms.
"""
