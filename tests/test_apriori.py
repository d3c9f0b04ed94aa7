"""Apriori baseline: hand cases and agreement with FP-Growth."""
from __future__ import annotations

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.mining.apriori import apriori
from repro.mining.fpgrowth import bruteforce, fpgrowth

HAN = [
    ["f", "a", "c", "d", "g", "i", "m", "p"],
    ["a", "b", "c", "f", "l", "m", "o"],
    ["b", "f", "h", "j", "o"],
    ["b", "c", "k", "s", "p"],
    ["a", "f", "c", "e", "l", "p", "m", "n"],
]


def test_han_example():
    assert apriori(HAN, 3 / 5) == bruteforce(HAN, 3 / 5)


def test_empty():
    assert apriori([], 0.5) == {}


def test_single_item():
    assert apriori([["a"], ["a"]], 0.5) == {frozenset(["a"]): 2}


def test_triangle():
    tx = [["a", "b", "c"]] * 3 + [["a", "b"]] + [["c"]]
    res = apriori(tx, 0.6)
    assert res[frozenset(["a", "b", "c"])] == 3
    assert res[frozenset(["a", "b"])] == 4


def test_no_frequent_items():
    tx = [["a"], ["b"], ["c"], ["d"]]
    assert apriori(tx, 0.5) == {}


@pytest.mark.parametrize("min_support", [0.1, 0.3, 0.5, 0.8])
def test_agrees_with_fpgrowth_random(min_support):
    import random

    rnd = random.Random(42)
    items = list("abcdefgh")
    tx = [rnd.sample(items, rnd.randint(1, 6)) for _ in range(50)]
    assert apriori(tx, min_support) == fpgrowth(tx, min_support)


@settings(max_examples=40, deadline=None)
@given(
    st.lists(
        st.lists(st.sampled_from("abcdef"), min_size=0, max_size=5),
        min_size=0,
        max_size=25,
    ),
    st.floats(min_value=0.05, max_value=1.0),
)
def test_property_agrees_with_fpgrowth(tx, min_support):
    assert apriori(tx, min_support) == fpgrowth(tx, min_support)


def test_deep_itemset():
    tx = [["a", "b", "c", "d", "e"]] * 5
    res = apriori(tx, 1.0)
    assert len(res) == 2**5 - 1
    assert res[frozenset("abcde")] == 5
