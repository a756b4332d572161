"""Flow-network construction: Algorithm 1 gadget, construct+ (Lemma 12),
Lemma 8 pruning safety."""
import numpy as np
import pytest

from repro.densest.network import (
    build_network,
    group_instances,
    lemma8_keep_mask,
    min_cut_vertices,
)


def _mincut_value(vertex_ids, members, alpha, p, grouped=False, keep_mask=None):
    net, s, t, vid2node, _ = build_network(
        vertex_ids, members, alpha, p, grouped=grouped, keep_mask=keep_mask
    )
    return net.max_flow(s, t)


def test_group_instances():
    members = np.array([[1, 2, 3, 4], [4, 3, 2, 1], [1, 2, 3, 5]])
    uniq, counts = group_instances(members)
    assert uniq.shape == (2, 4)
    assert sorted(counts.tolist()) == [1, 2]


def test_group_instances_empty():
    members = np.empty((0, 3), dtype=np.int64)
    uniq, counts = group_instances(members)
    assert uniq.shape[0] == 0 and counts.shape[0] == 0


def test_trivial_cut_capacity_is_h_mu():
    # alpha huge -> min cut is ({s}, rest) with capacity sum deg = h*mu
    members = np.array([[0, 1, 2], [1, 2, 3]])
    val = _mincut_value([0, 1, 2, 3], members, alpha=100.0, p=3)
    assert val == pytest.approx(3 * 2)


def test_alpha_zero_selects_everything():
    members = np.array([[0, 1, 2]])
    net, s, t, vid2node, _ = build_network([0, 1, 2], members, 0.0, 3)
    cut = min_cut_vertices(net, s, t, vid2node)
    assert cut == [0, 1, 2]


def test_binary_search_threshold_behaviour():
    # K4 triangles: mu=4, n=4, rho_opt=1. Cut empty iff alpha >= 1.
    from itertools import combinations

    members = np.array([list(c) for c in combinations(range(4), 3)])
    net, s, t, v2n, _ = build_network(range(4), members, 0.9, 3)
    assert min_cut_vertices(net, s, t, v2n) == [0, 1, 2, 3]
    net, s, t, v2n, _ = build_network(range(4), members, 1.1, 3)
    assert min_cut_vertices(net, s, t, v2n) == []


@pytest.mark.parametrize("alpha", [0.3, 0.7, 1.1, 2.0])
def test_lemma12_grouped_equals_ungrouped(alpha):
    """construct+ min-cut capacity == per-instance network capacity."""
    rng = np.random.default_rng(0)
    # duplicate-vertex-set instances (as diamonds produce)
    base = rng.integers(0, 8, size=(12, 4))
    base = base[np.array([len(set(r)) == 4 for r in base])]
    members = np.vstack([base, base[: len(base) // 2]])  # force duplicates
    vids = sorted(set(members.flatten()))
    v1 = _mincut_value(vids, members, alpha, 4, grouped=False)
    v2 = _mincut_value(vids, members, alpha, 4, grouped=True)
    assert v1 == pytest.approx(v2)


def test_lemma8_mask_shape_and_cap():
    members = np.array([[0, 1, 2], [3, 4, 5]])
    mask = lemma8_keep_mask(members, 6)
    assert mask.shape == (2,)
    assert lemma8_keep_mask(members, 6, cap=1).all()  # over cap -> keep all


def test_lemma8_prunes_isolated_instance():
    # dense K4-triangles + one remote triangle: removing the remote
    # triangle's vertices raises density, so it can be pruned
    from itertools import combinations

    dense = [list(c) for c in combinations(range(4), 3)]
    members = np.array(dense + [[10, 11, 12]])
    mask = lemma8_keep_mask(members, 7)
    assert mask[:4].all()
    assert not mask[4]


def test_network_node_count():
    members = np.array([[0, 1, 2], [1, 2, 3]])
    _, s, t, vid2node, n_nodes = build_network([0, 1, 2, 3], members, 1.0, 3)
    assert n_nodes == 1 + 4 + 2 + 1
    assert s == 0 and t == n_nodes - 1
