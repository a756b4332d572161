"""Classical k-core machinery (Def. 5).

Three entry points:

* ``k_core``            — the k-core subgraph for a fixed k, computed by the
  textbook iterative-pruning loop expressed as Spark dataflow (each round:
  degree aggregate + anti-join of under-degree vertices).
* ``core_numbers``      — core numbers of *all* vertices via the distributed
  h-index fixpoint (Montresor et al. [36] / Lü et al. [34]): iterate
  ``est(v) <- min(est(v), H({est(u) : u in N(v)}))`` from ``est = deg``;
  the fixpoint is exactly the coreness. Pure DataFrame ops — the h-index is
  a higher-order array aggregate, no Python UDFs.
* ``core_numbers_peel`` — exact driver-side bin/heap peeling (Batagelj-
  Zaversnik [7]); the test oracle and the small-subgraph inner loop.
"""
from __future__ import annotations

import heapq

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F

from repro.graph.ops import degrees, symmetrize, vertices

# h-index of an array column named ``vals`` (sorted desc, count prefix x>=rank)
_HINDEX = (
    "size(filter(transform(sort_array(vals, false), (x, i) -> x >= i + 1), b -> b))"
)


def k_core(edges: DataFrame, k: int, max_iter: int = 10_000) -> DataFrame:
    """Edges of the k-core of G (empty DataFrame if no k-core exists)."""
    cur = edges.localCheckpoint(eager=True)
    for _ in range(max_iter):
        deg = degrees(cur)
        bad = deg.where(F.col("deg") < k).select("v")
        if bad.limit(1).count() == 0:
            return cur
        keep = deg.where(F.col("deg") >= k).select("v")
        cur = (
            cur.join(keep.withColumnRenamed("v", "src"), "src", "left_semi")
            .join(keep.withColumnRenamed("v", "dst"), "dst", "left_semi")
            .select("src", "dst")
            .localCheckpoint(eager=True)
        )
    raise RuntimeError("k_core did not converge")  # pragma: no cover


def core_numbers(edges: DataFrame, max_iter: int = 10_000) -> DataFrame:
    """Core number per vertex — columns (v, core) — via h-index fixpoint."""
    sym = symmetrize(edges).localCheckpoint(eager=True)
    est = degrees(edges).withColumnRenamed("deg", "est").localCheckpoint(eager=True)
    for _ in range(max_iter):
        nbr = (
            sym.join(
                est.select(F.col("v").alias("u"), F.col("est").alias("nbr_est")), "u"
            )
            .groupBy("v")
            .agg(F.collect_list("nbr_est").alias("vals"))
        )
        new = (
            est.join(nbr, "v")
            .select("v", F.least("est", F.expr(_HINDEX)).alias("est"))
            .localCheckpoint(eager=True)
        )
        changed = (
            new.alias("n")
            .join(est.alias("o"), "v")
            .where(F.col("n.est") != F.col("o.est"))
            .limit(1)
            .count()
        )
        est = new
        if changed == 0:
            return est.withColumnRenamed("est", "core")
    raise RuntimeError("core_numbers did not converge")  # pragma: no cover


def core_numbers_peel(edge_pdf: pd.DataFrame, all_vertices=None) -> dict:
    """Exact core numbers by peeling a pandas edge list. Driver-side oracle."""
    src = edge_pdf["src"].to_numpy(np.int64)
    dst = edge_pdf["dst"].to_numpy(np.int64)
    vs = set(map(int, src)) | set(map(int, dst))
    if all_vertices is not None:
        vs |= set(map(int, all_vertices))
    adj: dict[int, list] = {v: [] for v in vs}
    for s, d in zip(src, dst):
        adj[int(s)].append(int(d))
        adj[int(d)].append(int(s))
    deg = {v: len(a) for v, a in adj.items()}
    heap = [(d, v) for v, d in deg.items()]
    heapq.heapify(heap)
    core: dict[int, int] = {}
    cur = 0
    removed: set[int] = set()
    while heap:
        d, v = heapq.heappop(heap)
        if v in removed or d != deg[v]:
            continue
        removed.add(v)
        cur = max(cur, deg[v])
        core[v] = cur
        for u in adj[v]:
            if u not in removed:
                deg[u] -= 1
                heapq.heappush(heap, (deg[u], u))
    return core


def max_core_vertices(core: dict) -> tuple:
    """(kmax, sorted vertices of the kmax-core) from a core-number map."""
    if not core:
        return 0, []
    kmax = max(core.values())
    return kmax, sorted(v for v, c in core.items() if c == kmax)


def gamma_upper_bounds(edges: DataFrame, h: int) -> DataFrame:
    """CoreApp's gamma(v) ranking bound — columns (v, gamma).

    h=2: the degree. h>=3: gamma(v) = C(core(v), h-1) from a classical
    core decomposition, per Algorithm 6. Note a subtlety the paper's
    prose glosses over: this is NOT an upper bound on the clique-degree
    deg_G(v, Psi) (a low-coreness vertex can sit in many cliques'
    worth of neighbour edges) — but it IS an upper bound on the
    clique-CORE number core_G(v, Psi): inside the (c,Psi)-core every
    vertex needs degree d with C(d, h-1) >= c, so the classical
    coreness x of its vertices satisfies C(x, h-1) >= c. That is
    exactly the invariant CoreApp's stopping criterion requires
    ("remaining gamma < k_max => remaining clique-core numbers <
    k_max"), so Algorithm 6 is correct with this gamma. Tested in
    test_kcore.py::test_gamma_upper_bounds_h3_dominates_clique_core.

    Layering: gamma is a one-shot preprocessing *ranking* for CoreApp,
    so the classical core numbers behind it come from the linear-time
    driver peel ([7], as the paper does); the distributed h-index
    fixpoint (``core_numbers``) remains the dataflow path used by the
    Nucleus baseline and the k-core API.
    """
    if h == 2:
        return degrees(edges).select("v", F.col("deg").cast("double").alias("gamma"))
    core = core_numbers_peel(edges.toPandas())
    pdf = pd.DataFrame({"v": list(core), "core": list(core.values())})
    x = pdf["core"].to_numpy(np.float64)
    g = np.ones_like(x)
    for i in range(h - 1):
        g = g * np.maximum(x - i, 0.0) / (i + 1)
    out = pd.DataFrame({"v": pdf["v"], "gamma": g})
    spark = edges.sparkSession
    return spark.createDataFrame(out)
