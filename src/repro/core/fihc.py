"""Frequent-Itemset-based Hierarchical Clustering pipeline (Figs 2–4).

mined patterns → canonical string patterns → label encoding → binary
cuisine×pattern features → condensed pdist (Euclidean / Cosine / Jaccard)
→ HAC → trees + geographic validation scores.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from ..cluster.distance import METRICS, pdist
from ..cluster.hac import linkage, to_newick
from ..geo.regions import geo_tree
from ..mining.patterns import feature_matrix
from ..mining.spark_fpm import mine_all_regions
from ..recipedb.vocab import MIN_SUPPORT, REGIONS
from .validate import (
    cophenetic_correlation,
    relationship_probes,
    triplet_agreement,
)


@dataclass
class FihcResult:
    """Everything the Figs 2–4 comparison needs."""

    features: np.ndarray                 # 26 × P binary incidence
    patterns: list[str]                  # column labels
    trees: dict[str, np.ndarray]         # metric -> linkage matrix
    newicks: dict[str, str]
    geo_scores: pd.DataFrame             # metric, cophenetic_corr, triplet_agreement
    probes: dict[str, dict[str, bool]]   # metric -> relationship probes


def fihc(
    recipes: DataFrame,
    *,
    min_support: float = MIN_SUPPORT,
    method: str = "average",
    metrics: tuple[str, ...] = METRICS,
    mined: DataFrame | None = None,
) -> FihcResult:
    """Run the full FIHC pipeline; pass ``mined`` to reuse a mining result."""
    if mined is None:
        mined = mine_all_regions(recipes, min_support)
    X, patterns = feature_matrix(mined, REGIONS)
    geo = geo_tree(REGIONS, method=method)
    trees: dict[str, np.ndarray] = {}
    newicks: dict[str, str] = {}
    rows = []
    probes: dict[str, dict[str, bool]] = {}
    for metric in metrics:
        Z = linkage(pdist(X, metric), method=method)
        trees[metric] = Z
        newicks[metric] = to_newick(Z, REGIONS)
        rows.append(
            {
                "metric": metric,
                "cophenetic_corr_vs_geo": round(cophenetic_correlation(Z, geo), 4),
                "triplet_agreement_vs_geo": round(triplet_agreement(Z, geo), 4),
            }
        )
        probes[metric] = relationship_probes(Z, REGIONS)
    return FihcResult(
        features=X,
        patterns=patterns,
        trees=trees,
        newicks=newicks,
        geo_scores=pd.DataFrame(rows),
        probes=probes,
    )
