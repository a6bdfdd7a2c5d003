"""Local 2-hop constructions (Algorithms 3 and 8) vs naive counting."""
import itertools

import pytest

from repro.core.twohop import adjacency_from_pairs, bi_two_hop, two_hop
from repro.graph.generators import random_bipartite


def naive_two_hop(g, alpha):
    adj = {v: set() for v in g.adj_v}
    for a, b in itertools.combinations(sorted(g.adj_v), 2):
        if len(g.adj_v[a] & g.adj_v[b]) >= alpha:
            adj[a].add(b)
            adj[b].add(a)
    return adj


def naive_bi_two_hop(g, alpha):
    adj = {v: set() for v in g.adj_v}
    for a, b in itertools.combinations(sorted(g.adj_v), 2):
        common = g.adj_v[a] & g.adj_v[b]
        per = {x: 0 for x in g.attrs_u}
        for u in common:
            per[g.u_val[u]] += 1
        if min(per.values()) >= alpha:
            adj[a].add(b)
            adj[b].add(a)
    return adj


@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("alpha", [1, 2, 3])
def test_two_hop_matches_naive(seed, alpha):
    g = random_bipartite(12, 10, 0.35, seed=seed)
    assert two_hop(g, alpha) == naive_two_hop(g, alpha)


@pytest.mark.parametrize("seed", range(10))
@pytest.mark.parametrize("alpha", [1, 2])
def test_bi_two_hop_matches_naive(seed, alpha):
    g = random_bipartite(12, 10, 0.4, seed=seed)
    assert bi_two_hop(g, alpha) == naive_bi_two_hop(g, alpha)


@pytest.mark.parametrize("seed", range(4))
def test_bi_two_hop_subset_of_two_hop(seed):
    """Per-attribute counts >= alpha implies total count >= alpha."""
    g = random_bipartite(12, 10, 0.4, seed=seed)
    h = two_hop(g, 2)
    hb = bi_two_hop(g, 2)
    for v in hb:
        assert hb[v] <= h[v]


def test_two_hop_alpha_monotone():
    g = random_bipartite(15, 12, 0.35, seed=2)
    h1, h2 = two_hop(g, 1), two_hop(g, 2)
    for v in h2:
        assert h2[v] <= h1[v]


def test_two_hop_mirror_gives_upper_side():
    g = random_bipartite(8, 8, 0.5, seed=7)
    hu = two_hop(g.mirror(), 2)
    # Naive on the upper side.
    for a, b in itertools.combinations(sorted(g.adj_u), 2):
        expected = len(g.adj_u[a] & g.adj_u[b]) >= 2
        assert (b in hu[a]) is expected


def test_adjacency_from_pairs():
    adj = adjacency_from_pairs([(1, 2), (2, 3)], [1, 2, 3, 4])
    assert adj == {1: {2}, 2: {1, 3}, 3: {2}, 4: set()}
