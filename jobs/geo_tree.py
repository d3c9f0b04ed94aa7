"""Reproduce Fig 6 (HAC over geographical distance between regions).

    python jobs/geo_tree.py          # no Spark needed
"""
from __future__ import annotations

import sys

sys.path.insert(0, "src")

from repro.cluster.hac import ascii_dendrogram, to_newick  # noqa: E402
from repro.geo.regions import geo_tree  # noqa: E402
from repro.recipedb.vocab import REGIONS  # noqa: E402


def main() -> None:
    Z = geo_tree(REGIONS, method="average")
    print("=== HAC dendrogram over geographic distance (Fig 6) ===")
    print(ascii_dendrogram(Z, REGIONS))
    print("newick:", to_newick(Z, REGIONS))


if __name__ == "__main__":
    main()
