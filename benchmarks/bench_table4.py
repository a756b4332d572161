"""Benchmark: Table 4 — EMcore vs CoreApp (classical k_max-core) on the
scaled large graphs. The paper's claim: CoreApp is the faster of the two.
"""
import pytest

from repro.cores.coreapp import kmax_core_coreapp
from repro.cores.emcore import kmax_core_emcore
from repro.graph import datasets as ds
from repro.patterns import edge

NAMES = ["dblp_s", "friendster_s", "uk2002_s"]


@pytest.fixture(scope="module")
def graphs(spark):
    out = {}
    for name in NAMES:
        g = ds.dataset(spark, name).localCheckpoint(eager=True)
        g.count()
        out[name] = g
    return out


@pytest.mark.parametrize("name", NAMES)
def test_bench_emcore(benchmark, spark, graphs, name):
    kmax, verts, _ = benchmark.pedantic(
        lambda: kmax_core_emcore(spark, graphs[name]), rounds=1, iterations=1
    )
    assert kmax > 0 and verts


@pytest.mark.parametrize("name", NAMES)
def test_bench_coreapp(benchmark, spark, graphs, name):
    kmax, verts, _ = benchmark.pedantic(
        lambda: kmax_core_coreapp(spark, graphs[name], edge()),
        rounds=1, iterations=1,
    )
    assert kmax > 0 and verts
