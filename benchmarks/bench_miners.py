"""T6 bench: FP-Growth vs Apriori vs Spark MLlib — the paper's §V-A claim
that FP-Growth is "an efficient and scalable method" vs candidate
generation.

Two workload shapes:
* Italian (16,582 recipes, shallow lattice of 63 patterns) — largest n;
* Northern Africa (1,611 recipes, deep 134-pattern lattice from the spice
  blocks) — where candidate generation pays the combinatorial price and
  FP-Growth's advantage shows (~2x in our runs).
"""
from __future__ import annotations

import pytest

from repro.mining.apriori import apriori
from repro.mining.fpgrowth import fpgrowth
from repro.mining.spark_fpm import mine_region_mllib

MIN_SUPPORT = 0.2
REGIONS_UNDER_TEST = ["Italian", "Northern Africa"]


@pytest.fixture(scope="module")
def tx_by_region(recipes_full_pdf):
    return {
        r: [list(t) for t in recipes_full_pdf[recipes_full_pdf["region"] == r]["items"]]
        for r in REGIONS_UNDER_TEST
    }


@pytest.mark.parametrize("region", REGIONS_UNDER_TEST)
def test_bench_fpgrowth_reference(benchmark, tx_by_region, region):
    res = benchmark.pedantic(
        fpgrowth, args=(tx_by_region[region], MIN_SUPPORT), rounds=3, iterations=1
    )
    assert len(res) > 20


@pytest.mark.parametrize("region", REGIONS_UNDER_TEST)
def test_bench_apriori_baseline(benchmark, tx_by_region, region):
    res = benchmark.pedantic(
        apriori, args=(tx_by_region[region], MIN_SUPPORT), rounds=3, iterations=1
    )
    assert len(res) > 20


def test_bench_mllib_fpgrowth(benchmark, spark, recipes_full):
    def run():
        return mine_region_mllib(recipes_full, "Italian", MIN_SUPPORT).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n > 30


def test_miners_agree_at_bench_scale(tx_by_region):
    for tx in tx_by_region.values():
        assert fpgrowth(tx, MIN_SUPPORT) == apriori(tx, MIN_SUPPORT)
