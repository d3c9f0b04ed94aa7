"""Tree-comparison metrics."""
from __future__ import annotations

import numpy as np
import pytest

from repro.cluster.distance import pdist
from repro.cluster.hac import linkage
from repro.core.validate import (
    closer_than,
    cophenetic_correlation,
    relationship_probes,
    triplet_agreement,
)
from repro.recipedb.vocab import REGIONS


@pytest.fixture
def tree_pair():
    rng = np.random.default_rng(0)
    X = rng.random((10, 4))
    Z1 = linkage(pdist(X, "euclidean"), "average")
    Y = X + rng.normal(0, 2.0, X.shape)  # heavily perturbed copy
    Z2 = linkage(pdist(Y, "euclidean"), "average")
    return Z1, Z2


def test_identical_trees_perfect_scores(tree_pair):
    Z1, _ = tree_pair
    assert cophenetic_correlation(Z1, Z1) == pytest.approx(1.0)
    assert triplet_agreement(Z1, Z1) == pytest.approx(1.0)


def test_scaled_heights_still_perfect(tree_pair):
    """Cophenetic correlation and triplet agreement are invariant to
    monotone height scaling."""
    Z1, _ = tree_pair
    Z2 = Z1.copy()
    Z2[:, 2] *= 7.5
    assert cophenetic_correlation(Z1, Z2) == pytest.approx(1.0)
    assert triplet_agreement(Z1, Z2) == pytest.approx(1.0)


def test_different_trees_imperfect(tree_pair):
    Z1, Z2 = tree_pair
    assert cophenetic_correlation(Z1, Z2) < 0.999
    assert triplet_agreement(Z1, Z2) < 1.0


def test_scores_bounded(tree_pair):
    Z1, Z2 = tree_pair
    assert -1.0 <= cophenetic_correlation(Z1, Z2) <= 1.0
    assert 0.0 <= triplet_agreement(Z1, Z2) <= 1.0


def test_leafcount_mismatch_rejected(tree_pair):
    Z1, _ = tree_pair
    small = linkage(pdist(np.random.default_rng(1).random((5, 2))), "average")
    with pytest.raises(ValueError):
        cophenetic_correlation(Z1, small)
    with pytest.raises(ValueError):
        triplet_agreement(Z1, small)


def test_closer_than_simple():
    # points on a line: a=0, b=1, c=10
    X = np.array([[0.0], [1.0], [10.0]])
    Z = linkage(pdist(X), "average")
    assert closer_than(Z, ["a", "b", "c"], "a", "b", "c")
    assert not closer_than(Z, ["a", "b", "c"], "a", "c", "b")


def test_relationship_probes_keys():
    rng = np.random.default_rng(2)
    X = rng.random((26, 5))
    Z = linkage(pdist(X), "average")
    probes = relationship_probes(Z, REGIONS)
    assert set(probes) == {
        "canadian_closer_to_french_than_us",
        "indian_closer_to_nafrica_than_thai",
        "indian_closer_to_nafrica_than_seasia",
    }
    assert all(isinstance(v, bool) for v in probes.values())


def test_triplet_agreement_random_baseline():
    """Two independent random trees should agree on roughly 1/3 of
    triples, far from 1.0."""
    rng = np.random.default_rng(3)
    Z1 = linkage(pdist(rng.random((15, 8))), "average")
    Z2 = linkage(pdist(rng.random((15, 8))), "average")
    score = triplet_agreement(Z1, Z2)
    assert 0.1 < score < 0.7
