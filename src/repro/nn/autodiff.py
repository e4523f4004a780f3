"""Reverse-mode automatic differentiation over NumPy arrays.

A :class:`Tensor` wraps an ``np.ndarray`` and records the operations
applied to it; :meth:`Tensor.backward` walks the tape in reverse
topological order and accumulates gradients. The op set is exactly what
GraphSAGE / GAT training requires:

* dense algebra: ``matmul``, ``+``, ``-``, ``*``, broadcasting add (bias)
* activations: ``relu``, ``leaky_relu``, ``elu``, ``sigmoid``, ``tanh``
* graph/segment ops: :func:`gather_rows`, :func:`segment_sum`,
  :func:`segment_mean`, :func:`segment_max`, :func:`segment_softmax`
* losses: :func:`softmax_cross_entropy`, :func:`bce_with_logits`

Gradients are checked against central finite differences in
``tests/test_autodiff.py``.
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "Tensor",
    "gather_rows",
    "segment_sum",
    "segment_mean",
    "segment_max",
    "segment_softmax",
    "concat",
    "softmax_cross_entropy",
    "bce_with_logits",
]


def _unbroadcast(grad: np.ndarray, shape: tuple) -> np.ndarray:
    """Sum ``grad`` down to ``shape`` (inverse of NumPy broadcasting)."""
    while grad.ndim > len(shape):
        grad = grad.sum(axis=0)
    for ax, dim in enumerate(shape):
        if dim == 1 and grad.shape[ax] != 1:
            grad = grad.sum(axis=ax, keepdims=True)
    return grad


class Tensor:
    """A node in the autodiff graph.

    ``requires_grad`` marks trainable leaves; interior nodes require grad
    iff any parent does. ``_backward`` pushes ``self.grad`` into parents.
    """

    __slots__ = ("data", "grad", "requires_grad", "_backward", "_parents")

    def __init__(self, data, requires_grad: bool = False):
        self.data = np.asarray(data, dtype=np.float64)
        self.grad: np.ndarray | None = None
        self.requires_grad = requires_grad
        self._backward = None
        self._parents: tuple[Tensor, ...] = ()

    # -- construction helpers ------------------------------------------
    @staticmethod
    def _wrap(other) -> "Tensor":
        return other if isinstance(other, Tensor) else Tensor(other)

    @staticmethod
    def _make(data, parents, backward) -> "Tensor":
        out = Tensor(data)
        if any(p.requires_grad for p in parents):
            out.requires_grad = True
            out._parents = tuple(parents)
            out._backward = backward
        return out

    @property
    def shape(self):
        return self.data.shape

    # -- arithmetic ----------------------------------------------------
    def __add__(self, other):
        other = self._wrap(other)

        def backward(g, a=self, b=other):
            if a.requires_grad:
                a._accum(_unbroadcast(g, a.data.shape))
            if b.requires_grad:
                b._accum(_unbroadcast(g, b.data.shape))

        return self._make(self.data + other.data, (self, other), backward)

    __radd__ = __add__

    def __neg__(self):
        def backward(g, a=self):
            if a.requires_grad:
                a._accum(-g)

        return self._make(-self.data, (self,), backward)

    def __sub__(self, other):
        return self + (-self._wrap(other))

    def __rsub__(self, other):
        return self._wrap(other) + (-self)

    def __mul__(self, other):
        other = self._wrap(other)

        def backward(g, a=self, b=other):
            if a.requires_grad:
                a._accum(_unbroadcast(g * b.data, a.data.shape))
            if b.requires_grad:
                b._accum(_unbroadcast(g * a.data, b.data.shape))

        return self._make(self.data * other.data, (self, other), backward)

    __rmul__ = __mul__

    def __truediv__(self, scalar: float):
        return self * (1.0 / scalar)

    def matmul(self, other: "Tensor") -> "Tensor":
        other = self._wrap(other)

        def backward(g, a=self, b=other):
            if a.requires_grad:
                a._accum(g @ b.data.T)
            if b.requires_grad:
                b._accum(a.data.T @ g)

        return self._make(self.data @ other.data, (self, other), backward)

    __matmul__ = matmul

    def sum(self, axis=None, keepdims: bool = False) -> "Tensor":
        def backward(g, a=self, axis=axis, keepdims=keepdims):
            if not a.requires_grad:
                return
            if axis is None:
                a._accum(np.full_like(a.data, g))
                return
            if not keepdims:
                g = np.expand_dims(g, axis)
            a._accum(np.broadcast_to(g, a.data.shape).copy())

        return self._make(self.data.sum(axis=axis, keepdims=keepdims), (self,), backward)

    def mean(self) -> "Tensor":
        return self.sum() / self.data.size

    def reshape(self, *shape) -> "Tensor":
        def backward(g, a=self):
            if a.requires_grad:
                a._accum(g.reshape(a.data.shape))

        return self._make(self.data.reshape(*shape), (self,), backward)

    # -- activations ----------------------------------------------------
    def relu(self) -> "Tensor":
        mask = self.data > 0

        def backward(g, a=self, m=mask):
            if a.requires_grad:
                a._accum(g * m)

        return self._make(self.data * mask, (self,), backward)

    def leaky_relu(self, alpha: float = 0.2) -> "Tensor":
        slope = np.where(self.data > 0, 1.0, alpha)

        def backward(g, a=self, s=slope):
            if a.requires_grad:
                a._accum(g * s)

        return self._make(self.data * slope, (self,), backward)

    def elu(self, alpha: float = 1.0) -> "Tensor":
        pos = self.data > 0
        out = np.where(pos, self.data, alpha * (np.exp(np.minimum(self.data, 0)) - 1))

        def backward(g, a=self, p=pos, o=out):
            if a.requires_grad:
                a._accum(g * np.where(p, 1.0, o + alpha))

        return self._make(out, (self,), backward)

    def sigmoid(self) -> "Tensor":
        s = 1.0 / (1.0 + np.exp(-self.data))

        def backward(g, a=self, s=s):
            if a.requires_grad:
                a._accum(g * s * (1 - s))

        return self._make(s, (self,), backward)

    def tanh(self) -> "Tensor":
        t = np.tanh(self.data)

        def backward(g, a=self, t=t):
            if a.requires_grad:
                a._accum(g * (1 - t * t))

        return self._make(t, (self,), backward)

    # -- autodiff machinery ----------------------------------------------
    def _accum(self, g: np.ndarray) -> None:
        self.grad = g if self.grad is None else self.grad + g

    def backward(self, grad=None) -> None:
        """Backpropagate from this (typically scalar) tensor."""
        topo: list[Tensor] = []
        seen: set[int] = set()
        stack = [(self, False)]
        while stack:  # iterative DFS: deep GNN tapes overflow recursion
            node, processed = stack.pop()
            if processed:
                topo.append(node)
                continue
            if id(node) in seen or not node.requires_grad:
                continue
            seen.add(id(node))
            stack.append((node, True))
            for p in node._parents:
                stack.append((p, False))
        self.grad = (
            np.ones_like(self.data) if grad is None else np.asarray(grad, dtype=np.float64)
        )
        for node in reversed(topo):
            if node._backward is not None:
                node._backward(node.grad)


# -- graph / segment operations ------------------------------------------


def gather_rows(x: Tensor, idx: np.ndarray) -> Tensor:
    """Select rows ``x[idx]``; backward scatter-adds into ``x``."""
    idx = np.asarray(idx, dtype=np.int64)

    def backward(g, a=x, i=idx):
        if a.requires_grad:
            acc = np.zeros_like(a.data)
            np.add.at(acc, i, g)
            a._accum(acc)

    return Tensor._make(x.data[idx], (x,), backward)


def segment_sum(x: Tensor, seg: np.ndarray, n: int) -> Tensor:
    """Sum rows of ``x`` by segment id ``seg`` into ``n`` output rows."""
    seg = np.asarray(seg, dtype=np.int64)
    out = np.zeros((n,) + x.data.shape[1:])
    np.add.at(out, seg, x.data)

    def backward(g, a=x, s=seg):
        if a.requires_grad:
            a._accum(g[s])

    return Tensor._make(out, (x,), backward)


def segment_mean(x: Tensor, seg: np.ndarray, n: int) -> Tensor:
    """Mean of rows of ``x`` per segment; empty segments yield zeros."""
    seg = np.asarray(seg, dtype=np.int64)
    counts = np.bincount(seg, minlength=n).astype(np.float64)
    safe = np.maximum(counts, 1.0)
    s = segment_sum(x, seg, n)
    return s * (1.0 / safe).reshape((n,) + (1,) * (x.data.ndim - 1))


def segment_max(x: Tensor, seg: np.ndarray, n: int) -> Tensor:
    """Per-segment max; empty segments yield zeros. Backward routes the
    gradient to the (first) argmax row of each segment."""
    seg = np.asarray(seg, dtype=np.int64)
    out = np.full((n,) + x.data.shape[1:], -np.inf)
    np.maximum.at(out, seg, x.data)
    empty = ~np.isin(np.arange(n), seg)
    out[empty] = 0.0
    is_max = x.data == out[seg]
    # break ties: keep only first max per (segment, column)
    order = np.argsort(seg, kind="stable")
    first = np.zeros_like(is_max)
    taken = np.zeros((n,) + x.data.shape[1:], dtype=bool)
    for r in order:
        sel = is_max[r] & ~taken[seg[r]]
        first[r] = sel
        taken[seg[r]] |= sel

    def backward(g, a=x, s=seg, m=first):
        if a.requires_grad:
            a._accum(g[s] * m)

    return Tensor._make(out, (x,), backward)


def segment_softmax(scores: Tensor, seg: np.ndarray, n: int) -> Tensor:
    """Softmax of ``scores`` (shape [E] or [E, H]) within each segment.

    This is GAT's attention normalization over a node's in-edges.
    """
    seg = np.asarray(seg, dtype=np.int64)
    mx = np.full((n,) + scores.data.shape[1:], -np.inf)
    np.maximum.at(mx, seg, scores.data)
    mx = np.where(np.isfinite(mx), mx, 0.0)
    ex = np.exp(scores.data - mx[seg])
    denom = np.zeros((n,) + scores.data.shape[1:])
    np.add.at(denom, seg, ex)
    p = ex / denom[seg]

    def backward(g, a=scores, s=seg, p=p, n=n):
        if a.requires_grad:
            dot = np.zeros((n,) + p.shape[1:])
            np.add.at(dot, s, g * p)
            a._accum(p * (g - dot[s]))

    return Tensor._make(p, (scores,), backward)


def concat(tensors: list[Tensor], axis: int = 1) -> Tensor:
    """Concatenate along ``axis``; backward slices the gradient."""
    sizes = [t.data.shape[axis] for t in tensors]
    offsets = np.cumsum([0] + sizes)

    def backward(g, ts=tensors, offs=offsets, ax=axis):
        for i, t in enumerate(ts):
            if t.requires_grad:
                sl = [slice(None)] * g.ndim
                sl[ax] = slice(offs[i], offs[i + 1])
                t._accum(g[tuple(sl)])

    return Tensor._make(
        np.concatenate([t.data for t in tensors], axis=axis), tuple(tensors), backward
    )


# -- losses -----------------------------------------------------------------


def softmax_cross_entropy(logits: Tensor, labels: np.ndarray) -> Tensor:
    """Mean softmax cross-entropy; ``labels`` are int class ids [N]."""
    labels = np.asarray(labels, dtype=np.int64)
    z = logits.data - logits.data.max(axis=1, keepdims=True)
    ex = np.exp(z)
    p = ex / ex.sum(axis=1, keepdims=True)
    n = logits.data.shape[0]
    loss = -np.log(np.maximum(p[np.arange(n), labels], 1e-12)).mean()

    def backward(g, a=logits, p=p, labels=labels, n=n):
        if a.requires_grad:
            grad = p.copy()
            grad[np.arange(n), labels] -= 1.0
            a._accum(g * grad / n)

    return Tensor._make(loss, (logits,), backward)


def bce_with_logits(logits: Tensor, targets: np.ndarray) -> Tensor:
    """Mean binary cross-entropy over all elements (multilabel tasks)."""
    t = np.asarray(targets, dtype=np.float64)
    z = logits.data
    # log(1+e^z) computed stably
    loss = (np.maximum(z, 0) - z * t + np.log1p(np.exp(-np.abs(z)))).mean()
    s = 1.0 / (1.0 + np.exp(-z))

    def backward(g, a=logits, s=s, t=t):
        if a.requires_grad:
            a._accum(g * (s - t) / t.size)

    return Tensor._make(loss, (logits,), backward)
