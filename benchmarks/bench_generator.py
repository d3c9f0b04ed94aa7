"""T5 bench: synthetic-RecipeDB generation at full scale (118k recipes,
26 cuisines) plus the Section-III statistics job."""
from __future__ import annotations

from repro.recipedb.generator import recipes_pdf
from repro.recipedb.stats import dataset_summary


def test_bench_generate_full_scale(benchmark):
    pdf = benchmark.pedantic(
        lambda: recipes_pdf(scale=1.0, seed=0), rounds=1, iterations=1
    )
    assert len(pdf) > 118_000


def test_bench_dataset_stats(benchmark, spark, recipes_full):
    def run():
        return dataset_summary(recipes_full)

    s = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(s) == 8
