"""Optimizer sanity: both optimizers minimize a convex quadratic."""
import numpy as np
import pytest

from repro.nn.autodiff import Tensor
from repro.nn.optim import SGD, Adam


def _quadratic(p: Tensor) -> Tensor:
    target = Tensor(np.array([[1.0, -2.0], [3.0, 0.5]]))
    d = p - target
    return (d * d).sum()


@pytest.mark.parametrize(
    "make_opt",
    [
        lambda ps: SGD(ps, lr=0.05),
        lambda ps: SGD(ps, lr=0.02, momentum=0.9),
        lambda ps: Adam(ps, lr=0.1),
    ],
)
def test_minimizes_quadratic(make_opt):
    p = Tensor(np.zeros((2, 2)), requires_grad=True)
    opt = make_opt({"p": p})
    for _ in range(200):
        opt.zero_grad()
        loss = _quadratic(p)
        loss.backward()
        opt.step()
    np.testing.assert_allclose(p.data, [[1.0, -2.0], [3.0, 0.5]], atol=1e-2)


def test_zero_grad_clears():
    p = Tensor(np.ones(3), requires_grad=True)
    opt = Adam({"p": p})
    (p * p).sum().backward()
    assert p.grad is not None
    opt.zero_grad()
    assert p.grad is None


def test_step_skips_paramless_grad():
    p = Tensor(np.ones(2), requires_grad=True)
    q = Tensor(np.ones(2), requires_grad=True)  # never used in loss
    opt = SGD({"p": p, "q": q}, lr=0.1)
    (p * p).sum().backward()
    opt.step()
    np.testing.assert_allclose(q.data, 1.0)
    assert not np.allclose(p.data, 1.0)


def test_adam_bias_correction_first_step():
    # after one step with g constant, Adam moves by ~lr regardless of g scale
    for scale in (1e-3, 1e3):
        p = Tensor(np.array([0.0]), requires_grad=True)
        opt = Adam({"p": p}, lr=0.1)
        (p * scale).sum().backward()
        opt.step()
        np.testing.assert_allclose(p.data, [-0.1], atol=1e-6)
