"""Unit tests for the simulated encoder zoo (repro.encoders.sim)."""
import numpy as np
import pytest

from repro.encoders.latent import LatentConfig, make_world
from repro.encoders.sim import REGISTRY, EncoderSpec, encode_channel, spec

WORLD = make_world(LatentConfig(n_objects=400, n_queries=60, n_classes=10, seed=5))


@pytest.mark.parametrize("name", sorted(REGISTRY))
def test_registry_specs_sane(name):
    e = spec(name)
    assert isinstance(e, EncoderSpec)
    assert e.dim > 0 and e.sigma >= 0
    if e.kind == "composition":
        assert e.obj_sigma is not None and 0 <= e.drift <= 1


def test_unknown_encoder_raises():
    with pytest.raises(KeyError):
        spec("bert-9000")


@pytest.mark.parametrize("name", ["resnet17", "resnet50", "lstm", "encoding", "clip"])
def test_encode_channel_shapes_and_norms(name):
    mod = 0 if spec(name).kind != "text" else 1
    obj, qry = encode_channel(WORLD, name, mod)
    assert obj.shape == (WORLD.n, spec(name).dim)
    assert qry.shape == (WORLD.nq, spec(name).dim)
    np.testing.assert_allclose(np.linalg.norm(obj, axis=1), 1.0, rtol=1e-4)
    np.testing.assert_allclose(np.linalg.norm(qry, axis=1), 1.0, rtol=1e-4)


@pytest.mark.parametrize("name", ["resnet50", "lstm", "tirg"])
def test_encode_channel_deterministic(name):
    mod = 0 if spec(name).kind != "text" else 1
    a = encode_channel(WORLD, name, mod)
    b = encode_channel(WORLD, name, mod)
    np.testing.assert_array_equal(a[0], b[0])
    np.testing.assert_array_equal(a[1], b[1])


def test_different_encoders_different_spaces():
    a, _ = encode_channel(WORLD, "resnet17", 0)
    b, _ = encode_channel(WORLD, "resnet50", 0)
    assert not np.allclose(a, b)


def test_different_modalities_different_projections():
    a, _ = encode_channel(WORLD, "resnet50", 0)
    b, _ = encode_channel(WORLD, "resnet50", 2)
    assert not np.allclose(a, b)


def test_sigma_ordering_controls_self_similarity():
    """Lower-noise encoders preserve latent similarity structure better:
    sibling objects (same content core) stay closer under resnet50 than
    resnet17."""
    def sibling_ip(name):
        obj, _ = encode_channel(WORLD, name, 0)
        return float(np.mean(np.einsum("ij,ij->i", obj[WORLD.gt], obj[WORLD.ref])))
    assert sibling_ip("resnet50") > sibling_ip("resnet17")


def test_text_encoder_ranks_same_state_higher():
    obj, qry = encode_channel(WORLD, "encoding", 1)
    sims = qry @ obj.T
    same_state = WORLD.state_id[None, :] == WORLD.state_id[WORLD.gt][:, None]
    assert sims[same_state].mean() > sims[~same_state].mean() + 0.3


def test_unimodal_image_query_embeds_reference_not_target():
    """The image query should look like the reference object, not the gt."""
    obj, qry = encode_channel(WORLD, "resnet50", 0)
    ip_ref = np.einsum("ij,ij->i", qry, obj[WORLD.ref])
    ip_gt = np.einsum("ij,ij->i", qry, obj[WORLD.gt])
    assert ip_ref.mean() > ip_gt.mean()


def test_composition_query_closer_to_target_state_than_unimodal():
    """Option 2: the fused query vector moves toward the gt relative to
    the raw reference-image query."""
    uobj, uqry = encode_channel(WORLD, "resnet50", 0)
    cobj, cqry = encode_channel(WORLD, "clip", 0)
    u_gap = np.einsum("ij,ij->i", uqry, uobj[WORLD.ref]) - np.einsum(
        "ij,ij->i", uqry, uobj[WORLD.gt]
    )
    c_gap = np.einsum("ij,ij->i", cqry, cobj[WORLD.ref]) - np.einsum(
        "ij,ij->i", cqry, cobj[WORLD.gt]
    )
    assert c_gap.mean() < u_gap.mean()


def test_composition_drift_ordering():
    """More drift (tirg > clip) keeps the query closer to the reference
    state: the gt-vs-ref gap shrinks less for tirg."""
    def gap(name):
        obj, qry = encode_channel(WORLD, name, 0)
        return float(
            np.mean(
                np.einsum("ij,ij->i", qry, obj[WORLD.gt])
                - np.einsum("ij,ij->i", qry, obj[WORLD.ref])
            )
        )
    assert gap("clip") > gap("tirg")


def test_composition_only_target_modality():
    with pytest.raises(ValueError):
        encode_channel(WORLD, "clip", 1)


def test_text_content_gain_adds_content_signal():
    w_gain = make_world(
        LatentConfig(n_objects=400, n_queries=60, n_classes=10, seed=5,
                     text_content_gain=0.8)
    )
    obj0, qry0 = encode_channel(WORLD, "lstm", 1)
    obj1, qry1 = encode_channel(w_gain, "lstm", 1)
    def content_corr(w, obj, qry):
        # same class but different state: content mention should help
        mask = (w.class_id[None, :] == w.class_id[w.gt][:, None]) & (
            w.state_id[None, :] != w.state_id[w.gt][:, None]
        )
        sims = qry @ obj.T
        return sims[mask].mean() - sims[~mask].mean()
    assert content_corr(w_gain, obj1, qry1) > content_corr(WORLD, obj0, qry0) + 0.02
