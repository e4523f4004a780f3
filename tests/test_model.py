"""GNNModel composition, prediction semantics, save/load signature files."""
import numpy as np
import pytest

from repro.core.model import GNNModel, build_gat, build_sage
from repro.nn.autodiff import Tensor

RNG = np.random.default_rng(5)


def tiny_graph(n=30, e=120, d=6):
    feat = RNG.standard_normal((n, d))
    src = RNG.integers(0, n, e)
    dst = RNG.integers(0, n, e)
    keep = src != dst
    return feat, src[keep], dst[keep]


@pytest.mark.parametrize("builder", [build_sage, build_gat])
@pytest.mark.parametrize("n_layers", [1, 2, 3])
def test_forward_shapes(builder, n_layers):
    feat, src, dst = tiny_graph()
    m = builder(6, 8, 4, n_layers=n_layers, seed=1)
    logits = m.forward_local(feat, src, dst).data
    assert logits.shape == (feat.shape[0], 4)
    assert m.n_layers == n_layers


def test_multiclass_predict_is_argmax():
    m = build_sage(6, 8, 4, seed=1)
    logits = RNG.standard_normal((10, 4))
    np.testing.assert_array_equal(m.predict(logits), logits.argmax(1))


def test_multilabel_predict_thresholds_zero():
    m = build_sage(6, 8, 4, task="multilabel", seed=1)
    logits = RNG.standard_normal((10, 4))
    np.testing.assert_array_equal(m.predict(logits), (logits > 0).astype(int))


def test_invalid_task_rejected():
    with pytest.raises(ValueError):
        build_sage(6, 8, 4, task="regression")


@pytest.mark.parametrize("builder", [build_sage, build_gat])
def test_save_load_identical_logits(builder, tmp_path):
    feat, src, dst = tiny_graph()
    m = builder(6, 8, 4, seed=3)
    m.save(tmp_path / "model")
    m2 = GNNModel.load(tmp_path / "model")
    np.testing.assert_allclose(
        m.forward_local(feat, src, dst).data,
        m2.forward_local(feat, src, dst).data,
        atol=1e-15,
    )


def test_signature_file_contents(tmp_path):
    import json

    m = build_gat(6, 8, 4, heads=2, seed=3)
    m.save(tmp_path / "model")
    sig = json.loads((tmp_path / "model" / "signature.json").read_text())
    assert [ls["kind"] for ls in sig["layers"]] == ["gat", "gat"]
    assert all(ls["partial"] is False for ls in sig["layers"])
    assert sig["head"] == {"in_dim": 8, "out_dim": 4}
    m2 = build_sage(6, 8, 4, agg="max", seed=3)
    m2.save(tmp_path / "model2")
    sig2 = json.loads((tmp_path / "model2" / "signature.json").read_text())
    assert all(
        ls["partial"] is True and ls["aggregator"] == "max" for ls in sig2["layers"]
    )


def test_parameters_cover_all_layers_and_head():
    m = build_sage(6, 8, 4, n_layers=2, seed=0)
    keys = set(m.parameters())
    assert {"layer0.w_self", "layer1.w_nbr", "head.w", "head.b"} <= keys


def test_parameters_are_views_not_copies():
    m = build_sage(6, 8, 4, seed=0)
    m.parameters()["head.b"].data[:] = 7.0
    assert (m.head.params["b"].data == 7.0).all()


def test_dims_chain_correctly():
    m = build_gat(10, 8, 3, n_layers=3, heads=2, seed=0)
    assert [(ly.in_dim, ly.out_dim) for ly in m.layers] == [(10, 8), (8, 8), (8, 8)]


def test_forward_accepts_tensor_input():
    feat, src, dst = tiny_graph()
    m = build_sage(6, 8, 4, seed=1)
    a = m.forward_local(feat, src, dst).data
    b = m.forward_local(Tensor(feat), src, dst).data
    np.testing.assert_allclose(a, b, atol=1e-15)
