"""Benchmark: Table 5 cells — CoreExact densities of CDS/PDS per pattern
on the small datasets, plus the PeelApp-vs-CoreApp approximation pair
(the Fig. 8/11 speedup-and-ratio evidence behind the Table 5 rows).
"""
import pytest

from repro.densest.core_exact import core_exact
from repro.densest.coreapp_dsd import core_app
from repro.densest.peel import peel_app
from repro.graph import datasets as ds
from repro.patterns import clique, diamond, star


@pytest.fixture(scope="module")
def s_dblp(spark):
    g = ds.dataset(spark, "s_dblp").localCheckpoint(eager=True)
    g.count()
    return g


@pytest.fixture(scope="module")
def netscience(spark):
    g = ds.dataset(spark, "netscience").localCheckpoint(eager=True)
    g.count()
    return g


PATTERNS = [clique(2), clique(3), clique(4), star(2), diamond()]


@pytest.mark.parametrize("pat", PATTERNS, ids=[p.name for p in PATTERNS])
def test_bench_coreexact_s_dblp(benchmark, spark, s_dblp, pat):
    res = benchmark.pedantic(
        lambda: core_exact(spark, s_dblp, pat), rounds=1, iterations=1
    )
    assert res.density > 0


@pytest.mark.parametrize("pat", [clique(3), clique(4)], ids=["triangle", "4-clique"])
def test_bench_coreexact_netscience(benchmark, spark, netscience, pat):
    res = benchmark.pedantic(
        lambda: core_exact(spark, netscience, pat), rounds=1, iterations=1
    )
    # the embedded K20 dominates: triangle rho = C(19,2)... >= 57
    assert res.density >= 20


def test_bench_peelapp_netscience_triangle(benchmark, spark, netscience):
    res = benchmark.pedantic(
        lambda: peel_app(spark, netscience, clique(3)), rounds=1, iterations=1
    )
    assert res.density > 0


def test_bench_coreapp_netscience_triangle(benchmark, spark, netscience):
    res = benchmark.pedantic(
        lambda: core_app(spark, netscience, clique(3)), rounds=1, iterations=1
    )
    assert res.density > 0
