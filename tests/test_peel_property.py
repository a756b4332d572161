"""Property-based checks of the driver peeling engine (no Spark).

Hypothesis generates random small instance-hypergraphs; we verify the
peel against first-principles definitions of the (k,Psi)-core.
"""
import numpy as np
from hypothesis import given, settings, strategies as st

from repro.cores.clique_core import (
    density_of,
    instances_inside,
    peel_decompose,
)

# random instance sets: up to 25 instances of arity 3 over vertices 0..11
instances_strategy = st.lists(
    st.lists(st.integers(0, 11), min_size=3, max_size=3, unique=True),
    min_size=0,
    max_size=25,
)


def _mk(members_list):
    if not members_list:
        return np.empty((0, 3), dtype=np.int64)
    return np.asarray(members_list, dtype=np.int64)


@settings(max_examples=60, deadline=None)
@given(instances_strategy)
def test_kmax_core_is_valid_core(members_list):
    members = _mk(members_list)
    allv = list(range(12))
    pr = peel_decompose(members, allv)
    core_set = {v for v, c in pr.core.items() if c >= pr.kmax}
    inside = members[instances_inside(members, core_set)] if members.size else members
    cdeg = {v: 0 for v in core_set}
    for row in inside:
        for v in row:
            cdeg[int(v)] += 1
    if pr.kmax > 0:
        assert min(cdeg.values()) >= pr.kmax


@settings(max_examples=60, deadline=None)
@given(instances_strategy)
def test_kmax_is_maximal(members_list):
    """No subgraph can have min clique-degree > kmax (Def. 6 maximality)."""
    members = _mk(members_list)
    pr = peel_decompose(members, list(range(12)))
    k = pr.kmax + 1
    # iterative pruning at k must annihilate the graph
    alive = set(range(12))
    while True:
        inside = members[instances_inside(members, alive)] if members.size else members
        cdeg = {v: 0 for v in alive}
        for row in inside:
            for v in row:
                cdeg[int(v)] += 1
        bad = {v for v, c in cdeg.items() if c < k}
        if not bad:
            break
        alive -= bad
    assert alive == set()


@settings(max_examples=60, deadline=None)
@given(instances_strategy)
def test_rho_prime_is_max_residual_density(members_list):
    members = _mk(members_list)
    allv = list(range(12))
    pr = peel_decompose(members, allv)
    # recompute residual densities from the recorded order
    best = density_of(members, set(allv))
    remaining = list(allv)
    order = pr.order
    for v in order[:-1]:
        remaining.remove(v)
        best = max(best, density_of(members, set(remaining)))
    assert abs(pr.rho_prime - best) < 1e-9
    assert abs(density_of(members, set(pr.best_vertices)) - best) < 1e-9


@settings(max_examples=60, deadline=None)
@given(instances_strategy)
def test_core_numbers_bounded_by_degree(members_list):
    members = _mk(members_list)
    pr = peel_decompose(members, list(range(12)))
    cdeg = {v: 0 for v in range(12)}
    for row in members:
        for v in row:
            cdeg[int(v)] += 1
    for v, c in pr.core.items():
        assert c <= cdeg[v]


@settings(max_examples=40, deadline=None)
@given(instances_strategy, st.integers(1, 4))
def test_core_nesting(members_list, k):
    members = _mk(members_list)
    pr = peel_decompose(members, list(range(12)))
    hi = {v for v, c in pr.core.items() if c >= k + 1}
    lo = {v for v, c in pr.core.items() if c >= k}
    assert hi <= lo
