"""T1 bench: full Table I reproduction (mining all 26 cuisines at support
0.2 over 118k recipes + named-pattern support SQL)."""
from __future__ import annotations

from repro.core.table1 import table1
from repro.mining.spark_fpm import mine_all_regions


def test_bench_mine_all_regions(benchmark, spark, recipes_full):
    def run():
        return mine_all_regions(recipes_full, 0.2).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n > 1000


def test_bench_table1_end_to_end(benchmark, spark, recipes_full):
    def run():
        return table1(recipes_full)

    t1 = benchmark.pedantic(run, rounds=1, iterations=1)
    # 26 regions; Korean/Middle Eastern/UK/US/Scandinavian carry 2 named
    # patterns and Northern Africa 3 -> 33 rows total.
    assert len(t1) == 33
