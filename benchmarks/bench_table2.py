"""Benchmark: Table 2 pipeline — dataset generation + characteristics.

One case per dataset class (small real / large scaled / synthetic).
"""
import pytest

from jobs.table2_datasets import run as table2_run


@pytest.mark.parametrize("name", ["netscience", "as733"])
def test_bench_table2_small(benchmark, spark, name):
    df = benchmark.pedantic(
        lambda: table2_run(spark, names=[name], triangle_stats=True),
        rounds=1, iterations=1,
    )
    assert df.iloc[0]["kmax_triangle"] > 0


@pytest.mark.parametrize("name", ["dblp_s", "uk2002_s"])
def test_bench_table2_large(benchmark, spark, name):
    df = benchmark.pedantic(
        lambda: table2_run(spark, names=[name], triangle_stats=False),
        rounds=1, iterations=1,
    )
    assert df.iloc[0]["edges"] > 10_000
