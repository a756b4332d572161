"""Approximation algorithms: PeelApp, IncApp, CoreApp, Nucleus, EMcore.

Checks the Lemma 9/11 ratio everywhere, and that the three core-based
approximations return the identical (k_max, Psi)-core.
"""
import pandas as pd
import pytest

from repro.cores.coreapp import kmax_core_coreapp
from repro.cores.emcore import kmax_core_emcore
from repro.cores.kcore import core_numbers_peel, max_core_vertices
from repro.densest.coreapp_dsd import core_app
from repro.densest.core_exact import core_exact
from repro.densest.incapp import inc_app
from repro.densest.nucleus import nucleus_app
from repro.densest.peel import peel_app
from repro.graph import generators as gen
from repro.graph.ops import edges_from_pandas
from repro.patterns import clique, diamond, edge, star, triangle

PATTERNS = [edge(), triangle(), star(2), diamond()]


@pytest.mark.parametrize("seed", [0, 1])
@pytest.mark.parametrize("pat", PATTERNS, ids=[p.name for p in PATTERNS])
def test_peel_ratio_bound(spark, seed, pat):
    pdf = gen.erdos_renyi_pandas(16, 0.35, seed=seed)
    g = edges_from_pandas(spark, pdf)
    opt = core_exact(spark, g, pat).density
    approx = peel_app(spark, g, pat).density
    assert approx >= opt / pat.nv - 1e-9
    assert approx <= opt + 1e-9


@pytest.mark.parametrize("seed", [0, 1])
@pytest.mark.parametrize("pat", PATTERNS, ids=[p.name for p in PATTERNS])
def test_kmax_core_ratio_bound(spark, seed, pat):
    """Lemma 9: the (kmax,Psi)-core is a 1/|V_Psi|-approximation."""
    pdf = gen.erdos_renyi_pandas(16, 0.35, seed=seed)
    g = edges_from_pandas(spark, pdf)
    opt = core_exact(spark, g, pat).density
    inc = inc_app(spark, g, pat).density
    assert inc >= opt / pat.nv - 1e-9


@pytest.mark.parametrize("pat", [edge(), triangle(), star(2)], ids=["edge", "tri", "2star"])
def test_incapp_coreapp_nucleus_agree(spark, pat):
    pdf = gen.compose(
        gen.clique_pandas(range(6)),
        gen.chung_lu_pandas(60, 150, alpha=2.4, seed=3, offset=10),
    )
    g = edges_from_pandas(spark, pdf)
    r_inc = inc_app(spark, g, pat)
    r_cap = core_app(spark, g, pat)
    r_nuc = nucleus_app(spark, g, pat)
    assert r_inc.kmax == r_cap.kmax == r_nuc.kmax
    assert r_inc.vertices == r_cap.vertices == r_nuc.vertices
    assert r_inc.density == pytest.approx(r_cap.density, abs=1e-9)


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_coreapp_kmax_matches_peel_edge(spark, seed):
    pdf = gen.chung_lu_pandas(120, 360, alpha=2.3, seed=seed)
    g = edges_from_pandas(spark, pdf)
    kmax, verts, _ = kmax_core_coreapp(spark, g, edge())
    want_k, want_v = max_core_vertices(core_numbers_peel(pdf))
    assert kmax == want_k
    assert verts == want_v


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_emcore_matches_peel_edge(spark, seed):
    pdf = gen.chung_lu_pandas(120, 360, alpha=2.3, seed=seed)
    g = edges_from_pandas(spark, pdf)
    kmax, verts, _ = kmax_core_emcore(spark, g)
    want_k, want_v = max_core_vertices(core_numbers_peel(pdf))
    assert kmax == want_k
    assert sorted(verts) == want_v


def test_emcore_on_embedded_clique(spark):
    pdf = gen.compose(
        gen.clique_pandas(range(10)),
        gen.chung_lu_pandas(200, 500, alpha=2.5, seed=5, offset=20),
    )
    g = edges_from_pandas(spark, pdf)
    kmax, verts, info = kmax_core_emcore(spark, g)
    assert kmax == 9
    assert set(range(10)) <= set(verts)
    assert info["rounds"] >= 1


def test_coreapp_triangle_on_embedded_clique(spark):
    pdf = gen.compose(
        gen.clique_pandas(range(7)),
        gen.chung_lu_pandas(80, 200, alpha=2.5, seed=7, offset=10),
    )
    g = edges_from_pandas(spark, pdf)
    kmax, verts, info = kmax_core_coreapp(spark, g, triangle())
    # K7: each vertex in C(6,2)=15 triangles
    assert kmax >= 15
    assert set(range(7)) <= set(verts)


def test_coreapp_stopping_criterion_small_w0(spark):
    """Starting from a tiny W must still find the global kmax-core."""
    pdf = gen.compose(
        gen.clique_pandas(range(6)),
        gen.chung_lu_pandas(100, 260, alpha=2.4, seed=9, offset=10),
    )
    g = edges_from_pandas(spark, pdf)
    k_small, v_small, _ = kmax_core_coreapp(spark, g, edge(), w0=4)
    k_ref, v_ref = max_core_vertices(core_numbers_peel(g.toPandas()))
    assert k_small == k_ref and v_small == v_ref


def test_peelapp_returns_best_residual(spark):
    # K5 + sparse tail: PeelApp's best prefix is the K5 (edge pattern)
    pdf = gen.compose(
        gen.clique_pandas(range(5)),
        pd.DataFrame({"src": [0, 20], "dst": [20, 21]}),
    )
    g = edges_from_pandas(spark, pdf)
    res = peel_app(spark, g, edge())
    assert res.vertices == [0, 1, 2, 3, 4]
    assert res.density == pytest.approx(2.0)


def test_approx_results_have_timings(spark):
    pdf = gen.erdos_renyi_pandas(20, 0.25, seed=11)
    g = edges_from_pandas(spark, pdf)
    for fn in (peel_app, inc_app):
        r = fn(spark, g, triangle())
        assert r.timings["total"] > 0
    r = core_app(spark, g, triangle())
    assert r.timings["total"] > 0
