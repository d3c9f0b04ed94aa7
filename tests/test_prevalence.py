"""Authenticity prevalence: Spark aggregations vs DuckDB oracle, relative
prevalence identities, dense matrix correctness."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.authenticity.prevalence import (
    authenticity_matrix,
    prevalence,
    relative_prevalence,
    top_authentic_items,
)
from repro.oracle import assert_equivalent
from repro.recipedb.vocab import REGIONS


@pytest.fixture(scope="module")
def long_ingredients(recipes_small_pdf) -> pd.DataFrame:
    return (
        recipes_small_pdf[["region", "recipe_id", "ingredients"]]
        .explode("ingredients")
        .rename(columns={"ingredients": "item"})
        .dropna(subset=["item"])
    )


def test_prevalence_oracle_cuisine_norm(spark, recipes_small, long_ingredients, recipes_small_pdf):
    got = prevalence(recipes_small, "ingredients", norm="cuisine")
    totals = recipes_small_pdf.groupby("region").size().reset_index(name="n_total")
    sql = """
        SELECT l.region, l.item,
               count(*) AS n_recipes_with_item,
               count(*) / any_value(t.n_total) AS prevalence
        FROM long l JOIN totals t ON l.region = t.region
        GROUP BY l.region, l.item
    """
    assert_equivalent(got, sql, long=long_ingredients, totals=totals)


def test_prevalence_oracle_dataset_norm(spark, recipes_small, long_ingredients, recipes_small_pdf):
    got = prevalence(recipes_small, "ingredients", norm="dataset")
    n = len(recipes_small_pdf)
    sql = f"""
        SELECT region, item, count(*) AS n_recipes_with_item,
               count(*) / {n} AS prevalence
        FROM long GROUP BY region, item
    """
    assert_equivalent(got, sql, long=long_ingredients)


def test_prevalence_bad_norm(spark, recipes_small):
    with pytest.raises(ValueError):
        prevalence(recipes_small, norm="nope")


def test_prevalence_bounds(spark, recipes_small):
    pdf = prevalence(recipes_small).toPandas()
    assert (pdf["prevalence"] > 0).all()
    assert (pdf["prevalence"] <= 1).all()


def test_signature_ingredients_prevalent(spark, recipes_small):
    """Sanity: Japanese soy sauce prevalence ~ its event probability."""
    pdf = prevalence(recipes_small).toPandas()
    row = pdf[(pdf["region"] == "Japanese") & (pdf["item"] == "soy sauce")]
    # 120 recipes at test scale -> sd ~ 0.046; 0.1 is a ~2-sigma band.
    assert float(row["prevalence"].iloc[0]) == pytest.approx(0.462, abs=0.1)


def test_relative_prevalence_window_matches_dense(spark, recipes_small):
    """The Spark window formula and the dense NumPy formula must agree on
    every (region, item) present in the sparse table."""
    prev = prevalence(recipes_small)
    rel_spark = relative_prevalence(prev, 26).toPandas()
    rel_dense, items = authenticity_matrix(recipes_small, REGIONS)
    idx = {r: i for i, r in enumerate(REGIONS)}
    jdx = {it: j for j, it in enumerate(items)}
    sample = rel_spark.sample(min(3000, len(rel_spark)), random_state=0)
    for row in sample.itertuples():
        dense_v = rel_dense[idx[row.region], jdx[row.item]]
        assert dense_v == pytest.approx(row.relative_prevalence, abs=1e-9)


def test_relative_prevalence_column_identity():
    """For each item, sum_c p_i^c = sum_c P_i^c * (1 - ... ) — concretely:
    sum of relative prevalences equals sum(P) - (n-1)^-1 * (n-1) * sum(P)
    ... which telescopes to 0 exactly. Verify on a toy matrix."""
    P = np.array([[0.5, 0.0], [0.1, 0.2], [0.0, 0.4]])
    n = 3
    rel = P - (P.sum(0, keepdims=True) - P) / (n - 1)
    # sum_c [P_ic - (S_i - P_ic)/(n-1)] = S_i - (n S_i - S_i)/(n-1) = 0
    assert np.allclose(rel.sum(axis=0), 0.0)


def test_authenticity_matrix_shape_and_items_sorted(spark, recipes_small):
    rel, items = authenticity_matrix(recipes_small, REGIONS)
    assert rel.shape == (26, len(items))
    assert items == sorted(items)


def test_authenticity_matrix_absent_item_negative(spark, recipes_small):
    """An item a cuisine never uses must get a strictly negative relative
    prevalence there if others use it (the "least prevalent" fingerprint)."""
    rel, items = authenticity_matrix(recipes_small, REGIONS)
    j = items.index("soy sauce")
    greek = rel[REGIONS.index("Greek"), j]
    japanese = rel[REGIONS.index("Japanese"), j]
    assert greek < 0 < japanese


def test_top_authentic_items_shape(spark, recipes_small):
    rel, items = authenticity_matrix(recipes_small, REGIONS)
    tops = top_authentic_items(rel, items, REGIONS, k=4)
    assert len(tops) == 26 * 8
    assert set(tops["side"]) == {"most", "least"}


def test_top_authentic_items_signature(spark, recipes_small):
    """Each cuisine's signature items should surface among its most
    authentic ingredients."""
    rel, items = authenticity_matrix(recipes_small, REGIONS)
    tops = top_authentic_items(rel, items, REGIONS, k=8)
    jp = set(tops[(tops["region"] == "Japanese") & (tops["side"] == "most")]["item"])
    assert "soy sauce" in jp
    mx = set(tops[(tops["region"] == "Mexican") & (tops["side"] == "most")]["item"])
    assert "cilantro" in mx
