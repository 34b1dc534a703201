"""Unit tests for the latent-factor world (repro.encoders.latent)."""
import numpy as np
import pytest

from repro.encoders.latent import LatentConfig, make_world


def small_cfg(**kw):
    base = dict(n_objects=300, n_queries=40, n_classes=10, seed=3)
    base.update(kw)
    return LatentConfig(**base)


def test_shapes():
    w = make_world(small_cfg())
    assert w.content.shape == (300, 24)
    assert w.state.shape == (300, 12)
    assert w.gt.shape == (40,) and w.ref.shape == (40,)
    assert w.q_content.shape == (40, 24)
    assert w.q_state_ref.shape == (40, 12)
    assert w.q_state_tgt.shape == (40, 12)
    assert w.n == 300 and w.nq == 40


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_deterministic(seed):
    a = make_world(small_cfg(seed=seed))
    b = make_world(small_cfg(seed=seed))
    np.testing.assert_array_equal(a.content, b.content)
    np.testing.assert_array_equal(a.gt, b.gt)


def test_different_seeds_differ():
    a = make_world(small_cfg(seed=0))
    b = make_world(small_cfg(seed=1))
    assert not np.array_equal(a.content, b.content)


def test_unit_norm_latents():
    w = make_world(small_cfg())
    for mat in (w.content, w.state, w.q_content, w.q_state_ref, w.q_state_tgt):
        np.testing.assert_allclose(np.linalg.norm(mat, axis=1), 1.0, rtol=1e-5)


def test_gt_and_ref_share_instance_but_not_state():
    w = make_world(small_cfg())
    assert np.all(w.instance_id[w.gt] == w.instance_id[w.ref])
    assert np.all(w.gt != w.ref)
    assert np.all(w.state_id[w.gt] != w.state_id[w.ref])


def test_query_content_is_reference_content():
    w = make_world(small_cfg())
    np.testing.assert_array_equal(w.q_content, w.content[w.ref])
    np.testing.assert_array_equal(w.q_state_ref, w.state[w.ref])


def test_query_state_tgt_near_state_center_not_object_state():
    """The text names the category: closer to the gt's state *center*
    than two sibling categories, and not an exact copy of the gt state."""
    w = make_world(small_cfg(query_state_jitter=0.05, state_spread=0.4))
    same = np.einsum("ij,ij->i", w.q_state_tgt, w.state[w.gt])
    ref = np.einsum("ij,ij->i", w.q_state_tgt, w.state[w.ref])
    assert same.mean() > ref.mean() + 0.3
    assert not np.allclose(w.q_state_tgt, w.state[w.gt])


def test_class_structure_tighter_within_class():
    w = make_world(small_cfg(class_spread=0.4))
    sims = w.content @ w.content.T
    same = sims[w.class_id[:, None] == w.class_id[None, :]]
    diff = sims[w.class_id[:, None] != w.class_id[None, :]]
    assert same.mean() > diff.mean() + 0.2


def test_instance_spread_reduces_sibling_similarity():
    tight = make_world(small_cfg(instance_spread=0.0))
    loose = make_world(small_cfg(instance_spread=0.8))
    def sib_sim(w):
        return float(np.mean(np.einsum("ij,ij->i", w.content[w.gt], w.content[w.ref])))
    assert sib_sim(tight) > sib_sim(loose)
    assert sib_sim(tight) > 0.999  # identical without spread


def test_states_per_instance_lt2_rejected():
    with pytest.raises(ValueError):
        make_world(small_cfg(states_per_instance=1))


@pytest.mark.parametrize("spi", [2, 3, 4])
def test_states_per_instance_respected(spi):
    w = make_world(small_cfg(states_per_instance=spi, n_objects=120))
    # every instance's objects carry distinct state ids
    for inst in np.unique(w.instance_id):
        ids = np.flatnonzero(w.instance_id == inst)
        states = w.state_id[ids]
        assert len(set(states.tolist())) == len(ids)


def test_gt_indices_in_range():
    w = make_world(small_cfg())
    assert w.gt.min() >= 0 and w.gt.max() < w.n
    assert w.ref.min() >= 0 and w.ref.max() < w.n
