"""T2 benchmark: Fig. 2 category-share heatmap data."""
from repro.core.stats import category_shares


def test_bench_t2_category_shares(benchmark, spark, bench_corpus):
    result = benchmark(lambda: category_shares(spark, bench_corpus).collect())
    assert len(result) > 22  # region × category rows
