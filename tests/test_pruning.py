"""Tests for neighbor selection strategies (repro.ann.pruning)."""
import numpy as np
import pytest

from repro.ann.distance import normalize
from repro.ann.nndescent import build_knn_graph
from repro.ann.pruning import STRATEGIES, select_neighbors


@pytest.fixture(scope="module")
def setup(spark):
    v = normalize(np.random.default_rng(0).standard_normal((250, 12)))
    knn = build_knn_graph(spark, v, gamma=10, eps=2, seed=0)
    b = spark.sparkContext.broadcast(v)
    yield spark, v, knn, b
    b.destroy()


@pytest.mark.parametrize("strategy", STRATEGIES)
def test_output_shape_and_validity(setup, strategy):
    spark, v, knn, b = setup
    out = select_neighbors(spark, b, knn, 10, strategy=strategy)
    assert out.shape == (250, 10)
    valid = out[out >= 0]
    assert valid.max() < 250
    assert np.all(out != np.arange(250)[:, None])


def test_none_strategy_no_diversification(setup):
    """'none' keeps the raw top-gamma of the candidate pool (candidate
    acquisition still applies, so quality only improves over the kNN)."""
    from repro.ann.nndescent import graph_quality

    spark, v, knn, b = setup
    out = select_neighbors(spark, b, knn, 10, strategy="none")
    assert graph_quality(v, out, sample=200) >= graph_quality(v, knn, sample=200) - 1e-9
    for o in range(0, 250, 50):
        row = out[o][out[o] >= 0]
        ips = v[row] @ v[o]
        assert np.all(np.diff(ips) <= 1e-6)


def test_mrng_invariant_holds(setup):
    """Every kept neighbor v satisfies IP(o,v) > IP(u,v) against all
    neighbors u kept before it (the MRNG rule, paper ③ / Lemma 2)."""
    spark, v, knn, b = setup
    out = select_neighbors(spark, b, knn, 10, strategy="mrng")
    for o in range(0, 250, 25):
        kept = out[o][out[o] >= 0]
        for j in range(1, len(kept)):
            vv = kept[j]
            prior = kept[:j]
            assert np.all(v[vv] @ v[o] > v[prior] @ v[vv] - 1e-6)


def test_mrng_prunes_some_edges(setup):
    spark, v, knn, b = setup
    out = select_neighbors(spark, b, knn, 10, strategy="mrng")
    assert (out >= 0).sum() < (knn >= 0).sum()


def test_alpha_larger_keeps_more_edges(setup):
    spark, v, knn, b = setup
    tight = select_neighbors(spark, b, knn, 10, strategy="alpha", alpha=1.0)
    loose = select_neighbors(spark, b, knn, 10, strategy="alpha", alpha=1.6)
    assert (loose >= 0).sum() >= (tight >= 0).sum()


def test_angle_invariant_holds(setup):
    """Kept neighbors are pairwise separated by >= the angle threshold
    w.r.t. the order they were admitted."""
    spark, v, knn, b = setup
    out = select_neighbors(spark, b, knn, 8, strategy="angle", angle_deg=60.0)
    cos60 = np.cos(np.deg2rad(60.0))
    for o in range(0, 250, 25):
        kept = out[o][out[o] >= 0]
        for j in range(1, len(kept)):
            ev = v[kept[j]] - v[o]
            for u in kept[:j]:
                eu = v[u] - v[o]
                c = ev @ eu / max(np.linalg.norm(ev) * np.linalg.norm(eu), 1e-12)
                assert c < cos60 + 1e-5


def test_first_neighbor_is_nearest_candidate(setup):
    spark, v, knn, b = setup
    out = select_neighbors(spark, b, knn, 10, strategy="mrng")
    for o in range(0, 250, 50):
        direct = knn[o][knn[o] >= 0]
        cand = np.unique(np.concatenate([direct, knn[direct].ravel()]))
        cand = cand[(cand != o) & (cand >= 0)]
        best = cand[np.argmax(v[cand] @ v[o])]
        assert out[o][0] == best


def test_invalid_strategy_raises(setup):
    spark, v, knn, b = setup
    with pytest.raises(ValueError):
        select_neighbors(spark, b, knn, 10, strategy="quantum")
