"""Authenticity-based clustering pipeline (Fig 5).

relative ingredient prevalence (Ahn-style authenticity) → Euclidean pdist
→ HAC → tree + geographic validation, mirroring ``core.fihc``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from ..authenticity.prevalence import authenticity_matrix
from ..cluster.distance import pdist
from ..cluster.hac import linkage, to_newick
from ..geo.regions import geo_tree
from ..recipedb.vocab import REGIONS
from .validate import (
    cophenetic_correlation,
    relationship_probes,
    triplet_agreement,
)


@dataclass
class AuthenticityResult:
    matrix: np.ndarray                  # 26 × |ingredients| relative prevalence
    items: list[str]
    tree: np.ndarray
    newick: str
    geo_scores: pd.DataFrame            # one row: cophenetic corr, triplet agreement
    probes: dict[str, bool]


def authenticity_clustering(
    recipes: DataFrame,
    *,
    column: str = "ingredients",
    norm: str = "cuisine",
    metric: str = "euclidean",
    method: str = "average",
) -> AuthenticityResult:
    """Cluster cuisines by relative ingredient prevalence (paper Fig 5:
    "Authenticity of Ingredients")."""
    rel, items = authenticity_matrix(recipes, REGIONS, column=column, norm=norm)
    Z = linkage(pdist(rel, metric), method=method)
    geo = geo_tree(REGIONS, method=method)
    scores = pd.DataFrame(
        [
            {
                "metric": f"authenticity-{metric}",
                "cophenetic_corr_vs_geo": round(cophenetic_correlation(Z, geo), 4),
                "triplet_agreement_vs_geo": round(triplet_agreement(Z, geo), 4),
            }
        ]
    )
    return AuthenticityResult(
        matrix=rel,
        items=items,
        tree=Z,
        newick=to_newick(Z, REGIONS),
        geo_scores=scores,
        probes=relationship_probes(Z, REGIONS),
    )
