"""Distributed h-clique enumeration vs closed forms, brute force, DuckDB."""
from itertools import combinations
from math import comb

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.cliques.enumerate import (
    clique_degrees,
    clique_instances,
    count_instances,
    instances_long,
    oriented_edges,
)
from repro.graph import generators as gen
from repro.graph.ops import edges_from_pandas
from repro.oracle import assert_equivalent


def brute_cliques(pdf: pd.DataFrame, h: int):
    es = set(zip(pdf["src"], pdf["dst"]))
    vs = sorted(set(pdf["src"]) | set(pdf["dst"]))
    out = []
    for sub in combinations(vs, h):
        if all((a, b) in es for a, b in combinations(sub, 2)):
            out.append(sub)
    return out


@pytest.fixture(scope="module")
def k7(spark):
    pdf = gen.clique_pandas(range(7))
    return edges_from_pandas(spark, pdf), pdf


@pytest.fixture(scope="module")
def rand_graph(spark):
    pdf = gen.erdos_renyi_pandas(25, 0.3, seed=42)
    return edges_from_pandas(spark, pdf), pdf


def test_oriented_edges_once_per_edge(rand_graph):
    g, pdf = rand_graph
    assert oriented_edges(g).count() == len(pdf)


def test_oriented_edges_acyclic_rank(rand_graph):
    g, _ = rand_graph
    from repro.graph.ops import degrees

    deg = {r["v"]: r["deg"] for r in degrees(g).collect()}
    for r in oriented_edges(g).collect():
        assert (deg[r["a"]], r["a"]) < (deg[r["b"]], r["b"])


@pytest.mark.parametrize("h", [2, 3, 4, 5, 6, 7])
def test_clique_counts_on_k7(spark, k7, h):
    g, _ = k7
    assert count_instances(spark, g, h) == comb(7, h)


def test_no_triangles_in_bipartite(spark):
    g = edges_from_pandas(spark, gen.biclique_pandas(range(5), range(5, 11)))
    assert count_instances(spark, g, 3) == 0


def test_path_graph_has_only_edges(spark):
    pdf = pd.DataFrame({"src": [0, 1, 2, 3], "dst": [1, 2, 3, 4]})
    g = edges_from_pandas(spark, pdf)
    assert count_instances(spark, g, 2) == 4
    assert count_instances(spark, g, 3) == 0


def test_h1_is_vertices(spark, rand_graph):
    g, pdf = rand_graph
    n = len(set(pdf["src"]) | set(pdf["dst"]))
    assert clique_instances(spark, g, 1).count() == n


def test_h2_is_edges(spark, rand_graph):
    g, pdf = rand_graph
    got = clique_instances(spark, g, 2).toPandas()
    got = set(map(tuple, got[["v1", "v2"]].to_numpy()))
    # oriented by (deg, id) — compare as unordered pairs
    want = {frozenset(t) for t in zip(pdf["src"], pdf["dst"])}
    assert {frozenset(t) for t in got} == want


@pytest.mark.parametrize("h", [3, 4, 5])
def test_clique_instances_vs_bruteforce(spark, rand_graph, h):
    g, pdf = rand_graph
    got = clique_instances(spark, g, h).toPandas()
    got_sets = {frozenset(r) for r in got.to_numpy()}
    want_sets = {frozenset(c) for c in brute_cliques(pdf, h)}
    assert got_sets == want_sets


@pytest.mark.parametrize("h", [3, 4])
def test_clique_degrees_vs_bruteforce(spark, rand_graph, h):
    g, pdf = rand_graph
    got = {r["v"]: r["cdeg"] for r in clique_degrees(spark, g, h).collect()}
    want = {}
    for c in brute_cliques(pdf, h):
        for v in c:
            want[v] = want.get(v, 0) + 1
    assert got == want


def test_triangle_count_oracle(spark, rand_graph):
    """DuckDB SQL triangle count == Spark enumeration count."""
    g, pdf = rand_graph
    got = clique_instances(spark, g, 3).agg(F.count("*").alias("n_tri"))
    sql = """
        SELECT COUNT(*) AS n_tri
        FROM e a JOIN e b ON a.dst = b.src JOIN e c
          ON a.src = c.src AND b.dst = c.dst
    """
    assert_equivalent(got, sql, e=pdf)


def test_instances_long_shape(spark, rand_graph):
    g, _ = rand_graph
    inst = clique_instances(spark, g, 3)
    long = instances_long(inst)
    assert long.count() == 3 * inst.count()
    assert long.select("iid").distinct().count() == inst.count()


def test_embedded_clique_dominates(spark):
    pdf = gen.compose(
        gen.clique_pandas(range(10)), gen.erdos_renyi_pandas(50, 0.05, seed=1, offset=20)
    )
    g = edges_from_pandas(spark, pdf)
    assert count_instances(spark, g, 5) >= comb(10, 5)
