"""Pattern canonicalisation, Spark label encoding, feature matrix."""
from __future__ import annotations

import numpy as np
import pytest

from repro.mining.patterns import (
    canon_pattern,
    encoded_patterns,
    feature_matrix,
    label_encode,
    pattern_strings,
)
from repro.recipedb.vocab import REGIONS


def test_canon_pattern_sorts():
    assert canon_pattern(["soy sauce", "add"]) == "add + soy sauce"
    assert canon_pattern(("b", "a")) == canon_pattern(("a", "b"))


def test_canon_pattern_single():
    assert canon_pattern(["butter"]) == "butter"


def test_pattern_strings_column(spark, mined_small):
    with_p = pattern_strings(mined_small)
    row = with_p.first()
    assert row["pattern"] == canon_pattern(row["items"])


def test_label_encode_dense_and_deterministic(spark, mined_small):
    with_p = pattern_strings(mined_small)
    enc1 = label_encode(with_p).toPandas().sort_values("pattern")
    enc2 = label_encode(with_p).toPandas().sort_values("pattern")
    assert enc1["label"].tolist() == enc2["label"].tolist()
    labels = sorted(enc1["label"])
    assert labels == list(range(len(labels)))  # dense 0..P-1
    # lexicographic order of patterns == numeric order of labels
    by_label = enc1.sort_values("label")["pattern"].tolist()
    assert by_label == sorted(by_label)


def test_encoded_patterns_rowcount(spark, mined_small, mined_small_pdf):
    enc = encoded_patterns(mined_small)
    assert enc.count() == len(mined_small_pdf)


def test_feature_matrix_binary_and_shaped(spark, mined_small):
    X, patterns = feature_matrix(mined_small, REGIONS)
    assert X.shape == (26, len(patterns))
    assert set(np.unique(X)) <= {0.0, 1.0}
    assert len(patterns) == len(set(patterns))
    assert patterns == sorted(patterns)


def test_feature_matrix_matches_membership(spark, mined_small, mined_small_pdf):
    X, patterns = feature_matrix(mined_small, REGIONS)
    col = {p: j for j, p in enumerate(patterns)}
    pdf = mined_small_pdf.copy()
    pdf["pattern"] = pdf["items"].map(canon_pattern)
    for region in ["Korean", "US", "Northern Africa"]:
        i = REGIONS.index(region)
        mined_set = set(pdf[pdf["region"] == region]["pattern"])
        on = {patterns[j] for j in np.nonzero(X[i])[0]}
        assert on == mined_set
    # row sums = per-region pattern counts
    counts = pdf.groupby("region").size()
    for region in REGIONS:
        assert X[REGIONS.index(region)].sum() == counts[region]


def test_feature_matrix_region_order(spark, mined_small):
    X1, _ = feature_matrix(mined_small, REGIONS)
    rev = list(reversed(REGIONS))
    X2, _ = feature_matrix(mined_small, rev)
    assert np.array_equal(X1[0], X2[-1])
