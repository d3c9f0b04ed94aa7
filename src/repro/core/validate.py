"""Tree-vs-tree validation metrics (paper Section VII).

The paper validates cuisine dendrograms against geography by visual
comparison; we quantify the comparison:

* **cophenetic correlation** — Pearson correlation between the condensed
  cophenetic distance vectors of two trees;
* **triplet agreement** — over all C(26, 3) leaf triples, the fraction
  where both trees agree on which pair merges first (rooted-triplet
  similarity, robust to height scaling);
* **relationship probes** — the paper's two headline qualitative claims
  (Canadian closer to French than to US; Indian Subcontinent closer to
  Northern Africa than to Thai / Southeast Asian) as booleans.
"""
from __future__ import annotations

import itertools

import numpy as np

from ..cluster.distance import condensed_index
from ..cluster.hac import cophenetic


def cophenetic_correlation(Z1: np.ndarray, Z2: np.ndarray) -> float:
    """Pearson correlation between two trees' cophenetic vectors (leaves
    must be in the same order)."""
    c1, c2 = cophenetic(Z1), cophenetic(Z2)
    if len(c1) != len(c2):
        raise ValueError("trees have different leaf counts")
    s1, s2 = c1.std(), c2.std()
    if s1 == 0 or s2 == 0:
        raise ValueError("degenerate tree: zero cophenetic variance")
    return float(np.corrcoef(c1, c2)[0, 1])


def _closest_pair(coph: np.ndarray, n: int, i: int, j: int, k: int) -> frozenset[int]:
    """Which pair of {i,j,k} has the smallest cophenetic distance (merges
    first). Ties return the union of tied pairs so agreement is graded
    correctly."""
    pairs = [(i, j), (i, k), (j, k)]
    d = [coph[condensed_index(n, min(a, b), max(a, b))] for a, b in pairs]
    lo = min(d)
    tied = [frozenset(p) for p, dv in zip(pairs, d) if dv <= lo + 1e-12]
    return tied[0] if len(tied) == 1 else frozenset().union(*tied)


def triplet_agreement(Z1: np.ndarray, Z2: np.ndarray) -> float:
    """Fraction of leaf triples on which the two trees agree about the
    first-merging pair."""
    n = Z1.shape[0] + 1
    if Z2.shape[0] + 1 != n:
        raise ValueError("trees have different leaf counts")
    c1, c2 = cophenetic(Z1), cophenetic(Z2)
    agree = 0
    total = 0
    for i, j, k in itertools.combinations(range(n), 3):
        p1 = _closest_pair(c1, n, i, j, k)
        p2 = _closest_pair(c2, n, i, j, k)
        total += 1
        # Agreement: some first-merging pair is shared (covers exact match
        # and the tie case where one side returns a union of tied pairs).
        if len(p1 & p2) >= 2:
            agree += 1
    return agree / total


def closer_than(
    Z: np.ndarray, labels: list[str], a: str, b: str, c: str
) -> bool:
    """True iff leaf ``a`` is closer (cophenetically) to ``b`` than to ``c``
    in the tree — the paper's "X is closer to Y than Z" claims."""
    n = Z.shape[0] + 1
    coph = cophenetic(Z)
    ia, ib, ic = labels.index(a), labels.index(b), labels.index(c)
    dab = coph[condensed_index(n, min(ia, ib), max(ia, ib))]
    dac = coph[condensed_index(n, min(ia, ic), max(ia, ic))]
    return bool(dab < dac)


def relationship_probes(Z: np.ndarray, labels: list[str]) -> dict[str, bool]:
    """The paper's Section-VII qualitative claims, as booleans."""
    return {
        "canadian_closer_to_french_than_us": closer_than(
            Z, labels, "Canadian", "French", "US"
        ),
        "indian_closer_to_nafrica_than_thai": closer_than(
            Z, labels, "Indian Subcontinent", "Northern Africa", "Thai"
        ),
        "indian_closer_to_nafrica_than_seasia": closer_than(
            Z, labels, "Indian Subcontinent", "Northern Africa", "Southeast Asian"
        ),
    }
