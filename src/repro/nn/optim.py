"""Optimizers over dicts of :class:`repro.nn.autodiff.Tensor` parameters."""
from __future__ import annotations

import numpy as np

from repro.nn.autodiff import Tensor


class SGD:
    """Plain stochastic gradient descent (optionally with momentum)."""

    def __init__(self, params: dict[str, Tensor], lr: float = 0.1, momentum: float = 0.0):
        self.params = params
        self.lr = lr
        self.momentum = momentum
        self._vel = {k: np.zeros_like(p.data) for k, p in params.items()}

    def zero_grad(self) -> None:
        for p in self.params.values():
            p.grad = None

    def step(self) -> None:
        for k, p in self.params.items():
            if p.grad is None:
                continue
            self._vel[k] = self.momentum * self._vel[k] - self.lr * p.grad
            p.data = p.data + self._vel[k]


class Adam:
    """Adam (Kingma & Ba) with bias correction."""

    def __init__(
        self,
        params: dict[str, Tensor],
        lr: float = 1e-2,
        betas: tuple[float, float] = (0.9, 0.999),
        eps: float = 1e-8,
    ):
        self.params = params
        self.lr = lr
        self.b1, self.b2 = betas
        self.eps = eps
        self._t = 0
        self._m = {k: np.zeros_like(p.data) for k, p in params.items()}
        self._v = {k: np.zeros_like(p.data) for k, p in params.items()}

    def zero_grad(self) -> None:
        for p in self.params.values():
            p.grad = None

    def step(self) -> None:
        self._t += 1
        for k, p in self.params.items():
            if p.grad is None:
                continue
            g = p.grad
            self._m[k] = self.b1 * self._m[k] + (1 - self.b1) * g
            self._v[k] = self.b2 * self._v[k] + (1 - self.b2) * g * g
            mhat = self._m[k] / (1 - self.b1**self._t)
            vhat = self._v[k] / (1 - self.b2**self._t)
            p.data = p.data - self.lr * mhat / (np.sqrt(vhat) + self.eps)
