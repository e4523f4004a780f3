"""SAGE / GAT layer semantics: stage decomposition equals the fused
forward, self-loops, isolated nodes, head mechanics."""
import numpy as np
import pytest

from repro.core.gat import GATConv
from repro.core.model import Dense
from repro.core.sage import SAGEConv
from repro.nn.autodiff import Tensor

RNG = np.random.default_rng(11)


def random_graph(n=40, e=160, d=6):
    feat = RNG.standard_normal((n, d))
    src = RNG.integers(0, n, e)
    dst = RNG.integers(0, n, e)
    keep = src != dst
    return feat, src[keep], dst[keep]


@pytest.mark.parametrize("agg", ["mean", "sum", "max"])
def test_sage_stage_decomposition_equals_forward(agg):
    """scatter -> apply_edge -> aggregate -> apply_node == forward."""
    feat, src, dst = random_graph()
    layer = SAGEConv(6, 8, agg=agg, rng=RNG)
    ref = layer.forward(Tensor(feat), src, dst).data

    msgs = layer.apply_edge(layer.scatter(feat)[src], None)
    aggr = layer.aggregator.finalize(
        layer.aggregator.lift_segments(msgs, dst, feat.shape[0])
    )
    # empty destinations: backend policy = zero aggregate
    mask = ~np.isin(np.arange(feat.shape[0]), dst)
    aggr[mask] = 0.0
    got = layer.apply_node(feat, aggr)
    np.testing.assert_allclose(got, ref, atol=1e-10)


@pytest.mark.parametrize("heads", [1, 2, 4])
def test_gat_union_equals_forward(heads):
    feat, src, dst = random_graph(d=8)
    layer = GATConv(8, 8, heads=heads, rng=RNG)
    ref = layer.forward(Tensor(feat), src, dst).data
    got = layer.apply_node_union(feat, feat[src], dst)
    np.testing.assert_allclose(got, ref, atol=1e-10)


def test_gat_isolated_node_uses_self_loop_only():
    """A node with no in-edges should attend only to itself."""
    feat, src, dst = random_graph(n=10)
    layer = GATConv(6, 6, heads=2, rng=RNG)
    # remove node 0's in-edges
    keep = dst != 0
    out = layer.apply_node_union(feat, feat[src[keep]], dst[keep])
    solo = layer.apply_node_union(feat, np.zeros((0, 6)), np.zeros(0, dtype=np.int64))
    np.testing.assert_allclose(out[0], solo[0], atol=1e-12)


def test_gat_attention_weights_are_convex():
    """Output of a linear-activation GAT lies in the convex hull of the
    transformed neighbor states (softmax weights sum to 1)."""
    n, d = 5, 4
    feat = RNG.standard_normal((n, d))
    layer = GATConv(d, 4, heads=1, act="none", rng=RNG)
    layer.params["b"].data[:] = 0.0
    src = np.array([1, 2, 3])
    dst = np.array([0, 0, 0])
    out = layer.apply_node_union(feat, feat[src], dst)
    z = (feat @ layer.params["w"].data).reshape(n, 1, 4)[:, 0, :]
    candidates = z[[1, 2, 3, 0]]  # neighbors + self
    lo, hi = candidates.min(0) - 1e-9, candidates.max(0) + 1e-9
    assert (out[0] >= lo).all() and (out[0] <= hi).all()


def test_sage_mean_of_constant_neighbors():
    """If all neighbors share the same state, mean-aggr equals that state."""
    n, d = 6, 3
    feat = np.ones((n, d))
    layer = SAGEConv(d, d, agg="mean", act="none", rng=RNG)
    src = np.array([1, 2, 3])
    dst = np.array([0, 0, 0])
    out = layer.forward(Tensor(feat), src, dst).data
    expect = feat @ layer.params["w_self"].data + feat @ layer.params["w_nbr"].data
    np.testing.assert_allclose(out[0], expect[0], atol=1e-12)


def test_sage_no_inedges_aggregates_zero():
    feat, _, _ = random_graph(n=8)
    layer = SAGEConv(6, 4, rng=RNG)
    out = layer.forward(Tensor(feat), np.zeros(0, np.int64), np.zeros(0, np.int64)).data
    expect = layer.apply_node(feat, np.zeros((8, 6)))
    np.testing.assert_allclose(out, expect, atol=1e-12)


def test_sage_relu_nonnegative():
    feat, src, dst = random_graph()
    out = SAGEConv(6, 5, act="relu", rng=RNG).forward(Tensor(feat), src, dst).data
    assert (out >= 0).all()


def test_dense_head_is_affine():
    head = Dense(4, 3, rng=RNG)
    x = RNG.standard_normal((7, 4))
    got = head(Tensor(x)).data
    np.testing.assert_allclose(
        got, x @ head.params["w"].data + head.params["b"].data, atol=1e-12
    )


@pytest.mark.parametrize("cls,kw", [(SAGEConv, {}), (GATConv, {"heads": 2})])
def test_layer_is_trainable(cls, kw):
    """One gradient step reduces a simple loss through the layer."""
    feat, src, dst = random_graph(d=6)
    layer = cls(6, 6, rng=RNG, **kw)
    target = RNG.standard_normal((feat.shape[0], 6))

    def loss_val():
        out = layer.forward(Tensor(feat), src, dst)
        d_ = out - Tensor(target)
        return (d_ * d_).sum()

    from repro.nn.optim import Adam

    opt = Adam(layer.params, lr=0.05)
    first = float(loss_val().data)
    for _ in range(25):
        opt.zero_grad()
        loss = loss_val()
        loss.backward()
        opt.step()
    assert float(loss_val().data) < first
