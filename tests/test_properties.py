"""Property-based tests (hypothesis) for the algebraic guarantees the
partial-gather strategy rests on: arbitrary message multisets, arbitrary
sender partitions — two-stage aggregation must equal one-stage."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.gas import MaxAgg, MeanAgg, SumAgg
from repro.nn.autodiff import Tensor, segment_softmax


@st.composite
def message_sets(draw):
    m = draw(st.integers(min_value=1, max_value=40))
    d = draw(st.integers(min_value=1, max_value=5))
    n = draw(st.integers(min_value=1, max_value=8))
    vals = draw(
        st.lists(
            st.floats(min_value=-100, max_value=100, allow_nan=False),
            min_size=m * d,
            max_size=m * d,
        )
    )
    seg = draw(st.lists(st.integers(min_value=0, max_value=n - 1), min_size=m, max_size=m))
    groups = draw(st.lists(st.integers(min_value=0, max_value=3), min_size=m, max_size=m))
    return np.array(vals).reshape(m, d), np.array(seg), np.array(groups), n


@settings(max_examples=60, deadline=None)
@given(data=message_sets(), agg_cls=st.sampled_from([SumAgg, MeanAgg, MaxAgg]))
def test_partial_gather_invariance(data, agg_cls):
    msgs, seg, groups, n = data
    agg = agg_cls(msgs.shape[1])
    one = agg.finalize(agg.lift_segments(msgs, seg, n))

    partials, psegs = [], []
    for gidx in np.unique(groups):
        pick = groups == gidx
        uniq, inv = np.unique(seg[pick], return_inverse=True)
        partials.append(agg.lift_segments(msgs[pick], inv, len(uniq)))
        psegs.append(uniq)
    two = agg.finalize(
        agg.merge_segments(np.concatenate(partials), np.concatenate(psegs), n)
    )
    mask = np.isin(np.arange(n), seg)
    np.testing.assert_allclose(one[mask], two[mask], rtol=1e-9, atol=1e-9)


@settings(max_examples=40, deadline=None)
@given(data=message_sets())
def test_aggregation_order_invariance(data):
    """Shuffling message arrival order never changes a mean aggregate —
    the determinism InferTurbo's consistency guarantee relies on."""
    msgs, seg, _, n = data
    agg = MeanAgg(msgs.shape[1])
    a = agg.finalize(agg.lift_segments(msgs, seg, n))
    perm = np.random.default_rng(0).permutation(len(seg))
    b = agg.finalize(agg.lift_segments(msgs[perm], seg[perm], n))
    np.testing.assert_allclose(a, b, rtol=1e-9, atol=1e-9)


@settings(max_examples=40, deadline=None)
@given(data=message_sets())
def test_segment_softmax_is_probability(data):
    scores, seg, _, n = data
    p = segment_softmax(Tensor(scores), seg, n).data
    assert (p >= 0).all() and (p <= 1 + 1e-12).all()
    sums = np.zeros((n, scores.shape[1]))
    np.add.at(sums, seg, p)
    mask = np.isin(np.arange(n), seg)
    np.testing.assert_allclose(sums[mask], 1.0, atol=1e-9)
