"""Benchmark: Table 3 cells — CoreExact (with decomposition-share
accounting) on the As-733 / Ca-HepTh stand-ins, plus the Exact baseline
on the feasible As-733 cells (the Fig. 8 speedup evidence).
"""
import pytest

from repro.densest.core_exact import core_exact
from repro.densest.exact import exact_densest
from repro.graph import datasets as ds
from repro.patterns import clique


@pytest.fixture(scope="module")
def as733(spark):
    g = ds.dataset(spark, "as733").localCheckpoint(eager=True)
    g.count()
    return g


@pytest.fixture(scope="module")
def ca_hepth(spark):
    g = ds.dataset(spark, "ca_hepth").localCheckpoint(eager=True)
    g.count()
    return g


@pytest.mark.parametrize("h", [2, 3, 4])
def test_bench_coreexact_as733(benchmark, spark, as733, h):
    res = benchmark.pedantic(
        lambda: core_exact(spark, as733, clique(h)), rounds=1, iterations=1
    )
    assert res.density > 0
    assert 0 <= res.timings["decompose"] <= res.timings["total"]


@pytest.mark.parametrize("h", [3, 4])
def test_bench_coreexact_ca_hepth(benchmark, spark, ca_hepth, h):
    res = benchmark.pedantic(
        lambda: core_exact(spark, ca_hepth, clique(h)), rounds=1, iterations=1
    )
    assert res.density > 0


def test_bench_exact_baseline_as733_triangle(benchmark, spark, as733):
    res = benchmark.pedantic(
        lambda: exact_densest(spark, as733, clique(3)), rounds=1, iterations=1
    )
    assert res.density > 0
