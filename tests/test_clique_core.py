"""(k,Psi)-cores: Alg. 3 peeling, distributed h-operator, Theorem 1 bounds."""
from math import comb

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.cores.clique_core import (
    clique_core,
    clique_core_numbers_hindex,
    collect_instances,
    density_of,
    instances_inside,
    peel_decompose,
)
from repro.graph import generators as gen
from repro.graph.ops import edges_from_pandas
from repro.patterns import clique, diamond, star, triangle, two_triangle
from repro.patterns.instances import pattern_instances


def _gather(spark, pdf, pat):
    g = edges_from_pandas(spark, pdf)
    inst = pattern_instances(spark, g, pat)
    members = collect_instances(inst, pat)
    allv = sorted(set(pdf["src"]) | set(pdf["dst"]))
    return g, inst, members, allv


def naive_clique_core(members: np.ndarray, allv, k: int) -> set:
    """Reference fixed-k (k,Psi)-core by repeated removal."""
    alive = set(allv)
    while True:
        inside = instances_inside(members, alive)
        cdeg = {v: 0 for v in alive}
        for row in members[inside]:
            for v in row:
                cdeg[int(v)] += 1
        bad = {v for v, c in cdeg.items() if c < k}
        if not bad:
            return alive
        alive -= bad
        if not alive:
            return alive


def test_k4_triangle_core():
    """Paper Example 3 analogue: each K4 vertex is in 3 triangles."""
    members = np.array([list(c) for c in
                        [(0, 1, 2), (0, 1, 3), (0, 2, 3), (1, 2, 3)]])
    pr = peel_decompose(members, [0, 1, 2, 3])
    assert pr.kmax == 3
    assert pr.core == {0: 3, 1: 3, 2: 3, 3: 3}


def test_peel_tracks_rho_prime():
    # K5 + pendant vertex: best residual is K5 itself (10 edges / 5)
    pdf = gen.compose(gen.clique_pandas(range(5)),
                      pd.DataFrame({"src": [0], "dst": [99]}))
    es = pdf.to_numpy()
    pr = peel_decompose(es, sorted(set(pdf["src"]) | set(pdf["dst"])))
    assert pr.kmax == 4
    assert abs(pr.rho_prime - 2.0) < 1e-9
    assert pr.best_vertices == [0, 1, 2, 3, 4]


@pytest.mark.parametrize("seed", [0, 1])
@pytest.mark.parametrize(
    "pat", [triangle(), clique(4), star(2), diamond(), two_triangle()],
    ids=["triangle", "4-clique", "2-star", "diamond", "2-triangle"],
)
def test_hindex_matches_peel(spark, seed, pat):
    pdf = gen.erdos_renyi_pandas(20, 0.35, seed=seed)
    g, inst, members, allv = _gather(spark, pdf, pat)
    got = {
        r["v"]: r["core"]
        for r in clique_core_numbers_hindex(spark, g, pat, inst=inst).collect()
    }
    pr = peel_decompose(members, allv)
    assert got == pr.core


@pytest.mark.parametrize("k", [1, 2, 3])
def test_fixed_k_core_matches_reference(spark, k):
    pdf = gen.erdos_renyi_pandas(22, 0.3, seed=3)
    pat = triangle()
    g, inst, members, allv = _gather(spark, pdf, pat)
    got = {r["v"] for r in clique_core(spark, g, k, pat, inst=inst).collect()}
    assert got == naive_clique_core(members, allv, k)


def test_fixed_k_core_matches_core_numbers(spark):
    pdf = gen.erdos_renyi_pandas(20, 0.35, seed=7)
    pat = triangle()
    g, inst, members, allv = _gather(spark, pdf, pat)
    pr = peel_decompose(members, allv)
    for k in range(1, pr.kmax + 1):
        got = {r["v"] for r in clique_core(spark, g, k, pat, inst=inst).collect()}
        assert got == {v for v, c in pr.core.items() if c >= k}


def test_nested_cores():
    pdf = gen.chung_lu_pandas(80, 240, seed=5)
    es = pdf.to_numpy()
    pr = peel_decompose(es, sorted(set(pdf["src"]) | set(pdf["dst"])))
    prev = None
    for k in range(pr.kmax, -1, -1):
        cur = {v for v, c in pr.core.items() if c >= k}
        if prev is not None:
            assert prev <= cur
        prev = cur


def test_theorem1_bounds(spark):
    """k/|V_Psi| <= rho(R_k, Psi) <= kmax for every k (Theorem 1)."""
    pdf = gen.erdos_renyi_pandas(20, 0.4, seed=11)
    pat = triangle()
    g, inst, members, allv = _gather(spark, pdf, pat)
    pr = peel_decompose(members, allv)
    for k in range(1, pr.kmax + 1):
        rk = {v for v, c in pr.core.items() if c >= k}
        rho = density_of(members, rk)
        assert rho >= k / pat.nv - 1e-9
        assert rho <= pr.kmax + 1e-9


def test_core_zero_for_instanceless_vertices(spark):
    # triangle + dangling path: path vertices have triangle-core 0
    pdf = pd.DataFrame({"src": [0, 1, 0, 2, 3], "dst": [1, 2, 2, 3, 4]})
    pat = triangle()
    g, inst, members, allv = _gather(spark, pdf, pat)
    got = {
        r["v"]: r["core"]
        for r in clique_core_numbers_hindex(spark, g, pat, inst=inst).collect()
    }
    assert got == {0: 1, 1: 1, 2: 1, 3: 0, 4: 0}


def test_density_helpers():
    members = np.array([[0, 1, 2], [1, 2, 3]])
    assert instances_inside(members, {0, 1, 2}).tolist() == [True, False]
    assert density_of(members, {0, 1, 2, 3}) == 0.5
    assert density_of(members, set()) == 0.0


def test_empty_instances():
    members = np.empty((0, 3), dtype=np.int64)
    pr = peel_decompose(members, [1, 2, 3])
    assert pr.kmax == 0
    assert pr.core == {1: 0, 2: 0, 3: 0}
    assert pr.rho_prime == 0.0
