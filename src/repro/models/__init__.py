"""Comparator models used in the paper's effectiveness studies (§5.2).

- ``mfb`` — maximal frequent (τ_U, τ_V)-biclique: the *same* (U_S, V_S)
  biclique must appear in at least λ snapshots.
- ``msg`` — maximal static group: the unilateral V-side model on the static
  graph (temporal information ignored).
"""
