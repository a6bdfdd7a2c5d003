"""Synthetic graph generators: determinism, shape, planted structure."""
import pytest

from repro.graph.generators import PlantedSpec, planted_bipartite, random_bipartite


@pytest.mark.parametrize("seed", range(5))
def test_random_bipartite_deterministic(seed):
    a = random_bipartite(15, 10, 0.3, seed=seed)
    b = random_bipartite(15, 10, 0.3, seed=seed)
    assert a == b


def test_random_bipartite_shape():
    g = random_bipartite(20, 13, 0.25, seed=1)
    assert g.n_u == 20 and g.n_v == 13
    assert g.attrs_u == (0, 1) and g.attrs_v == (0, 1)
    assert 0 < g.n_edges < 20 * 13


def test_random_bipartite_p_extremes():
    assert random_bipartite(5, 5, 0.0, seed=0).n_edges == 0
    assert random_bipartite(5, 5, 1.0, seed=0).n_edges == 25


@pytest.mark.parametrize("n_attrs", [2, 3])
def test_attribute_domain_size(n_attrs):
    g = random_bipartite(30, 30, 0.2, n_attrs_u=n_attrs, n_attrs_v=n_attrs, seed=3)
    assert g.attrs_u == tuple(range(n_attrs))
    assert set(g.u_val.values()) <= set(range(n_attrs))


SPEC = PlantedSpec(n_u=200, n_v=150, n_background=500, n_blocks=6, block_u=8, block_v=8)


@pytest.mark.parametrize("seed", range(4))
def test_planted_deterministic(seed):
    assert planted_bipartite(SPEC, seed=seed) == planted_bipartite(SPEC, seed=seed)


def test_planted_shape():
    g = planted_bipartite(SPEC, seed=0)
    assert g.n_u == 200 and g.n_v == 150
    # background + blocks minus collisions
    assert 500 * 0.8 < g.n_edges < 500 + 6 * 64


def test_planted_contains_dense_blocks():
    """The planted structure must create vertices of near-block degree."""
    g = planted_bipartite(SPEC, seed=0)
    top = max(len(nbrs) for nbrs in g.adj_u.values())
    assert top >= SPEC.block_v * 0.6


def test_planted_block_larger_than_graph_is_clamped():
    spec = PlantedSpec(n_u=5, n_v=5, n_background=3, n_blocks=1, block_u=50, block_v=50)
    g = planted_bipartite(spec, seed=0)
    assert g.n_u == 5 and g.n_v == 5


def test_different_seeds_differ():
    assert planted_bipartite(SPEC, seed=1) != planted_bipartite(SPEC, seed=2)
