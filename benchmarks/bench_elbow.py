"""T2 bench: K-means WCSS sweep (k = 1..10, 5 restarts each) over the
full-scale FIHC feature matrix."""
from __future__ import annotations

from repro.core.elbow import elbow


def test_bench_elbow(benchmark, spark, recipes_full, mined_full):
    def run():
        return elbow(recipes_full, mined=mined_full)

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(res.curve) == 10
