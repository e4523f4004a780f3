"""Gradient checks for the autodiff substrate: every op's analytic
gradient is compared against central finite differences."""
import numpy as np
import pytest

from repro.nn.autodiff import (
    Tensor,
    bce_with_logits,
    concat,
    gather_rows,
    segment_max,
    segment_mean,
    segment_softmax,
    segment_sum,
    softmax_cross_entropy,
)

RNG = np.random.default_rng(42)


def numeric_grad(f, x: np.ndarray, eps: float = 1e-6) -> np.ndarray:
    g = np.zeros_like(x)
    it = np.nditer(x, flags=["multi_index"])
    while not it.finished:
        i = it.multi_index
        x[i] += eps
        up = f(x)
        x[i] -= 2 * eps
        down = f(x)
        x[i] += eps
        g[i] = (up - down) / (2 * eps)
        it.iternext()
    return g


def check_grad(build_loss, shape, atol=1e-5):
    """build_loss(Tensor) -> scalar Tensor; compares grads on a random input."""
    x0 = RNG.standard_normal(shape)
    t = Tensor(x0.copy(), requires_grad=True)
    loss = build_loss(t)
    loss.backward()
    num = numeric_grad(lambda x: float(build_loss(Tensor(x)).data), x0.copy())
    np.testing.assert_allclose(t.grad, num, atol=atol)


@pytest.mark.parametrize("shape", [(3,), (4, 5), (2, 3, 4)])
def test_add_grad(shape):
    b = RNG.standard_normal(shape)
    check_grad(lambda t: ((t + b) * (t + 1.0)).sum(), shape)


@pytest.mark.parametrize("shape", [(4, 5), (2, 3)])
def test_mul_broadcast_bias_grad(shape):
    b = RNG.standard_normal(shape[-1])
    check_grad(lambda t: ((t + b) * 2.0).sum(), shape)


def test_bias_broadcast_receives_summed_grad():
    b = Tensor(np.zeros(3), requires_grad=True)
    x = Tensor(RNG.standard_normal((5, 3)))
    (x + b).sum().backward()
    np.testing.assert_allclose(b.grad, np.full(3, 5.0))


@pytest.mark.parametrize("m,k,n", [(3, 4, 5), (1, 2, 3), (6, 6, 6)])
def test_matmul_grad(m, k, n):
    w = RNG.standard_normal((k, n))
    check_grad(lambda t: (t @ Tensor(w)).sum(), (m, k))
    x = RNG.standard_normal((m, k))
    check_grad(lambda t: (Tensor(x) @ t).sum(), (k, n))


def test_sub_neg_div_grad():
    check_grad(lambda t: ((t - 1.5) / 2.0 - (-t)).sum(), (3, 3))


@pytest.mark.parametrize(
    "op", ["relu", "sigmoid", "tanh", "elu"]
)
def test_activation_grads(op):
    # shift away from the ReLU kink so finite differences are valid
    check_grad(lambda t: getattr(t + 0.05, op)().sum(), (4, 4))


def test_leaky_relu_grad():
    check_grad(lambda t: (t + 0.05).leaky_relu(0.2).sum(), (4, 4))


@pytest.mark.parametrize("axis,keepdims", [(0, False), (1, False), (1, True), (None, False)])
def test_sum_axis_grad(axis, keepdims):
    check_grad(lambda t: (t.sum(axis=axis, keepdims=keepdims) * 3.0).sum(), (3, 4))


def test_mean_grad():
    check_grad(lambda t: t.mean() * 7.0, (3, 4))


@pytest.mark.parametrize("shape,new", [((6, 4), (3, 2, 4)), ((2, 3, 4), (6, 4))])
def test_reshape_grad(shape, new):
    w = RNG.standard_normal(new)
    check_grad(lambda t: (t.reshape(*new) * w).sum(), shape)


@pytest.mark.parametrize("n,rows", [(5, 8), (3, 3), (4, 12)])
def test_gather_rows_grad(n, rows):
    idx = RNG.integers(0, n, rows)
    check_grad(lambda t: (gather_rows(t, idx) * 1.7).sum(), (n, 3))


@pytest.mark.parametrize("fn", [segment_sum, segment_mean])
def test_segment_sum_mean_grad(fn):
    seg = np.array([0, 0, 1, 2, 2, 2])
    w = RNG.standard_normal((4, 3))
    check_grad(lambda t: (fn(t, seg, 4) * w).sum(), (6, 3))


def test_segment_mean_empty_segment_is_zero():
    x = Tensor(RNG.standard_normal((3, 2)))
    out = segment_mean(x, np.array([0, 0, 2]), 4)
    np.testing.assert_allclose(out.data[1], 0.0)
    np.testing.assert_allclose(out.data[3], 0.0)


def test_segment_max_values_and_grad():
    x = np.array([[1.0], [5.0], [2.0], [7.0]])
    out = segment_max(Tensor(x), np.array([0, 0, 1, 1]), 3)
    np.testing.assert_allclose(out.data[:, 0], [5.0, 7.0, 0.0])
    seg = np.array([0, 0, 1, 1, 1])
    w = RNG.standard_normal((2, 2))
    check_grad(lambda t: (segment_max(t, seg, 2) * w).sum(), (5, 2))


def test_segment_softmax_sums_to_one():
    seg = np.array([0, 0, 0, 1, 1, 3])
    p = segment_softmax(Tensor(RNG.standard_normal((6, 2))), seg, 4)
    sums = np.zeros((4, 2))
    np.add.at(sums, seg, p.data)
    np.testing.assert_allclose(sums[[0, 1, 3]], 1.0)


@pytest.mark.parametrize("heads", [1, 2])
def test_segment_softmax_grad(heads):
    seg = np.array([0, 0, 1, 1, 1, 2])
    w = RNG.standard_normal((6, heads))
    check_grad(lambda t: (segment_softmax(t, seg, 3) * w).sum(), (6, heads))


def test_concat_grad():
    b = Tensor(RNG.standard_normal((3, 2)), requires_grad=True)
    a = Tensor(RNG.standard_normal((3, 4)), requires_grad=True)
    w = RNG.standard_normal((3, 6))
    (concat([a, b], axis=1) * w).sum().backward()
    np.testing.assert_allclose(a.grad, w[:, :4])
    np.testing.assert_allclose(b.grad, w[:, 4:])


def test_concat_axis0_grad():
    a = Tensor(RNG.standard_normal((2, 3)), requires_grad=True)
    b = Tensor(RNG.standard_normal((4, 3)), requires_grad=True)
    w = RNG.standard_normal((6, 3))
    (concat([a, b], axis=0) * w).sum().backward()
    np.testing.assert_allclose(a.grad, w[:2])
    np.testing.assert_allclose(b.grad, w[2:])


def test_softmax_cross_entropy_matches_manual():
    logits = RNG.standard_normal((5, 3))
    labels = np.array([0, 2, 1, 1, 0])
    loss = softmax_cross_entropy(Tensor(logits), labels)
    p = np.exp(logits - logits.max(1, keepdims=True))
    p /= p.sum(1, keepdims=True)
    expect = -np.log(p[np.arange(5), labels]).mean()
    assert abs(float(loss.data) - expect) < 1e-10


def test_softmax_cross_entropy_grad():
    labels = np.array([0, 2, 1, 1])
    check_grad(lambda t: softmax_cross_entropy(t, labels), (4, 3))


def test_bce_with_logits_grad():
    targets = (RNG.random((4, 3)) > 0.5).astype(float)
    check_grad(lambda t: bce_with_logits(t, targets), (4, 3))


def test_bce_with_logits_matches_manual():
    z = RNG.standard_normal((4, 2))
    t = (RNG.random((4, 2)) > 0.5).astype(float)
    got = float(bce_with_logits(Tensor(z), t).data)
    s = 1 / (1 + np.exp(-z))
    expect = -(t * np.log(s) + (1 - t) * np.log(1 - s)).mean()
    assert abs(got - expect) < 1e-10


def test_grad_accumulates_over_reuse():
    x = Tensor(np.array([2.0]), requires_grad=True)
    y = x * 3.0 + x * 4.0  # x used twice
    y.sum().backward()
    np.testing.assert_allclose(x.grad, [7.0])


def test_no_grad_tracking_without_requires_grad():
    x = Tensor(np.ones((2, 2)))
    y = (x @ Tensor(np.ones((2, 2)))).relu()
    assert not y.requires_grad and y._backward is None


def test_deep_chain_does_not_recurse():
    # 5000-op chain would blow Python's recursion limit if backward recursed
    x = Tensor(np.array([1.0]), requires_grad=True)
    y = x
    for _ in range(5000):
        y = y + 1.0
    y.sum().backward()
    np.testing.assert_allclose(x.grad, [1.0])
