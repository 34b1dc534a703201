"""Tests for graph assembly (repro.ann.graphs)."""
import numpy as np
import pytest

from repro.ann.distance import normalize
from repro.ann.graphs import (
    VARIANTS,
    GraphIndex,
    build_graph,
    centroid_seed,
    ensure_connectivity,
)


def vecs(n=200, d=12, seed=0):
    return normalize(np.random.default_rng(seed).standard_normal((n, d)))


def reachable_from(nbrs, seed_vertex):
    seen = {int(seed_vertex)}
    stack = [int(seed_vertex)]
    while stack:
        v = stack.pop()
        for u in nbrs[v]:
            if u >= 0 and int(u) not in seen:
                seen.add(int(u))
                stack.append(int(u))
    return seen


def test_centroid_seed_matches_numpy():
    v = vecs(50)
    c = v.mean(axis=0)
    assert centroid_seed(v) == int(np.argmax(v @ c))


def test_ensure_connectivity_repairs_disconnected():
    v = vecs(10)
    # two components: 0-4 ring, 5-9 ring
    nbrs = np.full((10, 2), -1, np.int32)
    for i in range(5):
        nbrs[i, 0] = (i + 1) % 5
        nbrs[5 + i, 0] = 5 + (i + 1) % 5
    out = ensure_connectivity(nbrs, 0, v)
    assert reachable_from(out, 0) == set(range(10))


def test_ensure_connectivity_noop_when_connected():
    nbrs = np.array([[1], [2], [0]], np.int32)
    v = vecs(3)
    out = ensure_connectivity(nbrs, 0, v)
    np.testing.assert_array_equal(out, nbrs)


def test_ensure_connectivity_bridge_is_nearest_visited():
    v = vecs(6)
    nbrs = np.full((6, 1), -1, np.int32)
    nbrs[0, 0] = 1
    nbrs[1, 0] = 0
    out = ensure_connectivity(nbrs, 0, v)
    assert reachable_from(out, 0) == set(range(6))


@pytest.mark.parametrize("variant", sorted(VARIANTS))
def test_build_graph_variants(spark, variant):
    v = vecs(150)
    g = build_graph(spark, v, gamma=8, eps=2, variant=variant, seed=0)
    assert isinstance(g, GraphIndex)
    assert g.n == 150
    assert 0 <= g.seed_vertex < 150
    assert g.build_seconds > 0
    assert g.meta["variant"] == variant
    if VARIANTS[variant]["connect"]:
        assert reachable_from(g.nbrs, g.seed_vertex) == set(range(150))


def test_build_graph_invalid_variant(spark):
    with pytest.raises(ValueError):
        build_graph(spark, vecs(20), variant="btree")


def test_graph_index_properties(spark):
    v = vecs(100)
    g = build_graph(spark, v, gamma=6, eps=1, seed=0)
    assert g.n_edges == (g.nbrs >= 0).sum()
    assert g.nbytes() == g.nbrs.nbytes


def test_build_deterministic(spark):
    v = vecs(120)
    a = build_graph(spark, v, gamma=6, eps=2, seed=1)
    b = build_graph(spark, v, gamma=6, eps=2, seed=1)
    np.testing.assert_array_equal(a.nbrs, b.nbrs)
    assert a.seed_vertex == b.seed_vertex


def test_mrng_variant_sparser_than_kgraph(spark):
    v = vecs(200)
    ours = build_graph(spark, v, gamma=10, eps=2, variant="ours", seed=0)
    kg = build_graph(spark, v, gamma=10, eps=2, variant="kgraph", seed=0)
    assert ours.n_edges < kg.n_edges
