"""T4 bench: authenticity pipeline (Spark prevalence aggregation over ~1.2M
exploded ingredient rows -> relative prevalence -> HAC)."""
from __future__ import annotations

from repro.core.authenticity import authenticity_clustering


def test_bench_authenticity_pipeline(benchmark, spark, recipes_full):
    def run():
        return authenticity_clustering(recipes_full)

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.matrix.shape[0] == 26
    assert res.tree.shape == (25, 4)
