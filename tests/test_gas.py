"""The GAS abstraction: aggregator laws, annotations, signatures."""
import numpy as np
import pytest

from repro.core.gas import GASLayer, MaxAgg, MeanAgg, SumAgg, UnionAgg
from repro.core.gat import GATConv
from repro.core.sage import SAGEConv

RNG = np.random.default_rng(7)
AGGS = [SumAgg, MeanAgg, MaxAgg]


def _direct(agg_name: str, msgs: np.ndarray, seg: np.ndarray, n: int) -> np.ndarray:
    """One-shot reference aggregation per segment."""
    out = np.zeros((n, msgs.shape[1]))
    for s in range(n):
        rows = msgs[seg == s]
        if len(rows) == 0:
            continue
        if agg_name == "sum":
            out[s] = rows.sum(0)
        elif agg_name == "mean":
            out[s] = rows.mean(0)
        else:
            out[s] = rows.max(0)
    return out


@pytest.mark.parametrize("cls", AGGS)
@pytest.mark.parametrize("n,m,d", [(4, 12, 3), (1, 5, 2), (6, 6, 4)])
def test_lift_finalize_matches_direct(cls, n, m, d):
    agg = cls(d)
    msgs = RNG.standard_normal((m, d))
    seg = RNG.integers(0, n, m)
    got = agg.finalize(agg.lift_segments(msgs, seg, n))
    expect = _direct(agg.name, msgs, seg, n)
    # only compare segments that received messages (empty-segment policy
    # is the backend's job)
    mask = np.isin(np.arange(n), seg)
    np.testing.assert_allclose(got[mask], expect[mask], atol=1e-12)


@pytest.mark.parametrize("cls", AGGS)
@pytest.mark.parametrize("n_groups", [2, 3, 5])
def test_two_stage_equals_one_stage(cls, n_groups):
    """The partial-gather guarantee: lift per sender group, then merge,
    equals a single global lift — because merge is comm.+assoc."""
    n, m, d = 5, 40, 3
    agg = cls(d)
    msgs = RNG.standard_normal((m, d))
    seg = RNG.integers(0, n, m)
    sender = RNG.integers(0, n_groups, m)

    one = agg.finalize(agg.lift_segments(msgs, seg, n))

    partials, psegs = [], []
    for gidx in range(n_groups):
        pick = sender == gidx
        if not pick.any():
            continue
        sub_seg = seg[pick]
        uniq, inv = np.unique(sub_seg, return_inverse=True)
        partials.append(agg.lift_segments(msgs[pick], inv, len(uniq)))
        psegs.append(uniq)
    stacked = np.concatenate(partials)
    stacked_seg = np.concatenate(psegs)
    two = agg.finalize(agg.merge_segments(stacked, stacked_seg, n))

    mask = np.isin(np.arange(n), seg)
    np.testing.assert_allclose(one[mask], two[mask], atol=1e-12)


@pytest.mark.parametrize("cls", AGGS)
def test_merge_is_commutative(cls):
    agg = cls(3)
    a = agg.lift_segments(RNG.standard_normal((4, 3)), np.zeros(4, dtype=int), 1)
    b = agg.lift_segments(RNG.standard_normal((6, 3)), np.zeros(6, dtype=int), 1)
    ab = agg.merge_segments(np.concatenate([a, b]), np.zeros(2, dtype=int), 1)
    ba = agg.merge_segments(np.concatenate([b, a]), np.zeros(2, dtype=int), 1)
    np.testing.assert_allclose(ab, ba, atol=1e-12)


@pytest.mark.parametrize("cls", AGGS)
def test_merge_is_associative(cls):
    agg = cls(2)
    parts = [
        agg.lift_segments(RNG.standard_normal((3, 2)), np.zeros(3, dtype=int), 1)
        for _ in range(3)
    ]
    left = agg.merge_segments(np.concatenate([parts[0], parts[1]]), np.zeros(2, int), 1)
    lr = agg.merge_segments(np.concatenate([left, parts[2]]), np.zeros(2, int), 1)
    right = agg.merge_segments(np.concatenate([parts[1], parts[2]]), np.zeros(2, int), 1)
    rl = agg.merge_segments(np.concatenate([parts[0], right]), np.zeros(2, int), 1)
    np.testing.assert_allclose(
        agg.finalize(lr), agg.finalize(rl), atol=1e-12
    )


def test_mean_partial_carries_count():
    agg = MeanAgg(2)
    assert agg.partial_dim == 3
    msgs = np.array([[2.0, 4.0], [4.0, 8.0]])
    p = agg.lift_segments(msgs, np.array([0, 0]), 1)
    np.testing.assert_allclose(p, [[6.0, 12.0, 2.0]])
    np.testing.assert_allclose(agg.finalize(p), [[3.0, 6.0]])


def test_max_empty_segment_finalizes_to_zero():
    agg = MaxAgg(2)
    p = agg.lift_segments(np.array([[-5.0, -1.0]]), np.array([1]), 3)
    out = agg.finalize(p)
    np.testing.assert_allclose(out[0], 0.0)
    np.testing.assert_allclose(out[1], [-5.0, -1.0])
    np.testing.assert_allclose(out[2], 0.0)


def test_union_aggregator_refuses_prereduce():
    with pytest.raises(RuntimeError):
        UnionAgg(4).lift_segments(np.zeros((2, 4)), np.zeros(2, int), 1)


# -- annotation rule (paper §IV-B): partial iff aggregate is comm+assoc ----


def test_sage_annotated_partial():
    layer = SAGEConv(4, 8)
    assert layer.partial is True
    assert layer.broadcastable is True
    assert layer.aggregator.name == "mean"


def test_gat_annotated_not_partial():
    layer = GATConv(4, 8, heads=2)
    assert layer.partial is False  # attention breaks the rule
    assert layer.broadcastable is True  # message is raw src state
    assert layer.aggregator.name == "union"


@pytest.mark.parametrize("agg", ["mean", "sum", "max"])
def test_sage_signature_roundtrip_fields(agg):
    sig = SAGEConv(4, 8, agg=agg).signature()
    assert sig == {
        "kind": "sage",
        "in_dim": 4,
        "out_dim": 8,
        "partial": True,
        "broadcastable": True,
        "aggregator": agg,
        "act": "relu",
    }


def test_gat_signature_fields():
    sig = GATConv(4, 8, heads=2).signature()
    assert sig["kind"] == "gat" and sig["heads"] == 2 and sig["partial"] is False


def test_base_layer_scatter_is_state():
    layer = GASLayer(3, 3)
    h = RNG.standard_normal((5, 3))
    np.testing.assert_array_equal(layer.scatter(h), h)
    np.testing.assert_array_equal(layer.apply_edge(h, None), h)


def test_sage_rejects_unknown_aggregator():
    with pytest.raises(ValueError):
        SAGEConv(4, 8, agg="median")


def test_gat_rejects_indivisible_heads():
    with pytest.raises(ValueError):
        GATConv(4, 9, heads=2)
