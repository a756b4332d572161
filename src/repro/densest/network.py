"""Flow-network construction for the densest-subgraph binary search.

``build_network`` mirrors Algorithm 1 lines 5-12: source -> vertex arcs
with capacity deg(v, Psi), vertex -> sink arcs with capacity
alpha * |V_Psi|, and per-instance gadgets (v -> psi cap 1,
psi -> v cap |V_Psi| - 1). ``grouped=True`` is construct+ (Algorithm 7):
instances sharing a vertex set collapse into one group node g with
v -> g cap |g| and g -> v cap |g| * (|V_Psi| - 1). Lemma 12 guarantees
identical min-cut capacity (tested).

The returned solver exposes the min-cut source side; the subgraph
candidate is its vertex part.
"""
from __future__ import annotations

from collections import Counter

import numpy as np

from repro.flow.dinic import Dinic


def group_instances(members: np.ndarray) -> tuple:
    """construct+ grouping: unique member-sets with multiplicities.

    Returns (unique_members, counts) where unique_members is
    (num_groups, p) with rows sorted ascending per-row.
    """
    if members.shape[0] == 0:
        return members, np.zeros(0, dtype=np.int64)
    rows = np.sort(members, axis=1)
    uniq, counts = np.unique(rows, axis=0, return_counts=True)
    return uniq, counts


def build_network(
    vertex_ids,
    members: np.ndarray,
    alpha: float,
    p: int,
    grouped: bool = False,
    keep_mask: np.ndarray | None = None,
):
    """Build the Algorithm-1 / construct+ flow network.

    ``vertex_ids``: vertices of the (sub)graph the network is built on.
    ``members``:    instance member matrix restricted to that subgraph.
    ``keep_mask``:  optional boolean mask from Lemma-8 pruning — masked-out
                    instances get no node, and source capacities are the
                    degrees over *kept* instances only (per the Lemma 8
                    proof, clique-degrees drop by one per removed instance).

    Returns (dinic, s, t, vid2node, n_nodes) with vertex nodes 1..n.
    """
    vids = sorted(int(v) for v in vertex_ids)
    vid2node = {v: i + 1 for i, v in enumerate(vids)}
    nv = len(vids)

    if keep_mask is not None and members.shape[0]:
        members = members[keep_mask]
    if grouped:
        gm, gcount = group_instances(members)
    else:
        gm, gcount = members, np.ones(members.shape[0], dtype=np.int64)

    ng = gm.shape[0]
    s = 0
    t = nv + ng + 1
    net = Dinic(t + 1)

    deg = Counter()
    for r in range(ng):
        c = int(gcount[r])
        for v in gm[r]:
            deg[int(v)] += c

    for v in vids:
        net.add_edge(s, vid2node[v], float(deg[v]))
        net.add_edge(vid2node[v], t, alpha * p)
    for r in range(ng):
        gnode = nv + 1 + r
        c = int(gcount[r])
        for v in gm[r]:
            net.add_edge(vid2node[int(v)], gnode, float(c))
            net.add_edge(gnode, vid2node[int(v)], float(c * (p - 1)))
    return net, s, t, vid2node, t + 1


def min_cut_vertices(net: Dinic, s: int, t: int, vid2node: dict) -> list:
    """Run max-flow and return graph vertices on the source side of the cut."""
    net.max_flow(s, t)
    side = net.min_cut_source_side(s)
    return sorted(v for v, node in vid2node.items() if node in side)


def lemma8_keep_mask(members: np.ndarray, n_vertices: int, cap: int = 20_000) -> np.ndarray:
    """Lemma-8 instance pruning mask (True = keep the instance node).

    An instance psi may be dropped if deleting its members from G raises
    the density: mu'/(n-p) > mu/n where mu' counts instances avoiding
    psi's members. Applied only when |Lambda| <= cap (it is a
    constant-factor optimization; skipping it never affects correctness).
    """
    m = members.shape[0]
    if m == 0 or m > cap:
        return np.ones(m, dtype=bool)
    p = members.shape[1]
    if n_vertices <= p:
        return np.ones(m, dtype=bool)
    # vertex -> sorted array of instance ids
    v2i: dict[int, list] = {}
    for r in range(m):
        for v in members[r]:
            v2i.setdefault(int(v), []).append(r)
    v2i = {v: np.asarray(a) for v, a in v2i.items()}
    keep = np.ones(m, dtype=bool)
    base = m / n_vertices
    for r in range(m):
        touched = np.unique(np.concatenate([v2i[int(v)] for v in members[r]]))
        mu_prime = m - len(touched)
        if mu_prime / (n_vertices - p) > base:
            keep[r] = False
    return keep
