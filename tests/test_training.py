"""Mini-batch k-hop training: losses drop, models beat chance, and the
trained computation flow is exactly what inference deploys."""
import numpy as np
import pytest

from repro.core.evaluation import score
from repro.core.model import build_gat, build_sage
from repro.core.reference import forward_full
from repro.core.training import full_batch_loss, train_model
from repro.graphs.generators import planted_labels
from repro.graphs.local import LocalGraph

RNG = np.random.default_rng(0)


def labeled_graph(n=300, e=2400, d=8, c=5, multilabel=False):
    feat = RNG.standard_normal((n, d))
    src = RNG.integers(0, n, e)
    dst = RNG.integers(0, n, e)
    keep = src != dst
    src, dst = src[keep], dst[keep]
    y = planted_labels(feat, src, dst, n_classes=c, multilabel=multilabel, seed=1)
    split = np.array(
        ["train"] * (n // 3) + ["val"] * (n // 6) + ["test"] * (n - n // 3 - n // 6),
        dtype=object,
    )
    return LocalGraph(feat=feat, src=src, dst=dst, labels=y, split=split)


def test_loss_decreases_sage():
    g = labeled_graph()
    m = build_sage(8, 16, 5, seed=2)
    hist = train_model(m, g, epochs=6, batch_size=32, fanout=8, lr=0.02, seed=0)
    assert hist[-1] < hist[0] * 0.8


def test_loss_decreases_gat():
    g = labeled_graph()
    m = build_gat(8, 16, 5, seed=2)
    hist = train_model(m, g, epochs=6, batch_size=32, fanout=8, lr=0.02, seed=0)
    assert hist[-1] < hist[0] * 0.9


@pytest.mark.parametrize("builder", [build_sage, build_gat])
def test_beats_chance_on_test_split(builder):
    g = labeled_graph()
    m = builder(8, 16, 5, seed=2)
    train_model(m, g, epochs=10, batch_size=32, fanout=8, lr=0.02, seed=0)
    pred = m.predict(forward_full(m, g))
    acc = score("multiclass", pred[g.mask("test")], g.labels[g.mask("test")])
    assert acc > 1.5 / 5  # well above the 20% chance level


def test_multilabel_training():
    g = labeled_graph(c=6, multilabel=True)
    m = build_sage(8, 16, 6, task="multilabel", seed=2)
    hist = train_model(m, g, epochs=6, batch_size=32, fanout=8, lr=0.02, seed=0)
    assert hist[-1] < hist[0]
    pred = m.predict(forward_full(m, g))
    f1 = score("multilabel", pred[g.mask("test")], g.labels[g.mask("test")])
    assert f1 > 0.5


def test_training_requires_labels():
    g = labeled_graph()
    g.labels = None
    with pytest.raises(ValueError):
        train_model(build_sage(8, 16, 5), g, epochs=1)


def test_training_is_seed_deterministic():
    g = labeled_graph()
    m1 = build_sage(8, 16, 5, seed=2)
    m2 = build_sage(8, 16, 5, seed=2)
    h1 = train_model(m1, g, epochs=2, batch_size=32, fanout=4, lr=0.02, seed=9)
    h2 = train_model(m2, g, epochs=2, batch_size=32, fanout=4, lr=0.02, seed=9)
    assert h1 == h2
    np.testing.assert_allclose(forward_full(m1, g), forward_full(m2, g), atol=1e-15)


def test_full_batch_loss_runs_on_each_split():
    g = labeled_graph()
    m = build_sage(8, 16, 5, seed=2)
    for split in ("train", "val", "test"):
        assert np.isfinite(full_batch_loss(m, g, split))


def test_graph_signal_exists():
    """Planted labels must depend on the graph: a structure-aware teacher
    should fit them far better than chance even from few epochs."""
    g = labeled_graph()
    m = build_sage(8, 24, 5, seed=2)
    train_model(m, g, epochs=12, batch_size=32, fanout=10, lr=0.02, seed=0)
    pred = m.predict(forward_full(m, g))
    train_acc = score("multiclass", pred[g.mask("train")], g.labels[g.mask("train")])
    assert train_acc > 0.5
