"""Shared test fixtures: one small synthetic RecipeDB + one mining result
per session, reused across test modules (generation and mining are
deterministic, so sharing is safe)."""
from __future__ import annotations

import pandas as pd
import pytest

TEST_SCALE = 0.05
TEST_SEED = 0


@pytest.fixture(scope="session")
def recipes_small(spark):
    """26-cuisine synthetic RecipeDB at test scale (~6k recipes), cached."""
    from repro.recipedb.generator import recipes

    df = recipes(spark, scale=TEST_SCALE, seed=TEST_SEED).cache()
    df.count()  # materialise once
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def recipes_small_pdf(recipes_small) -> pd.DataFrame:
    """The same dataset collected to pandas (for local miners / oracle)."""
    return recipes_small.toPandas()


@pytest.fixture(scope="session")
def mined_small(spark, recipes_small):
    """Grouped FP-Growth result at support 0.2 over the test dataset."""
    from repro.mining.spark_fpm import mine_all_regions

    df = mine_all_regions(recipes_small, 0.2).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def mined_small_pdf(mined_small) -> pd.DataFrame:
    return mined_small.toPandas()
