"""The GAS-like layer abstraction and commutative/associative aggregators.

An :class:`Aggregator` expresses a reduce function in lift/merge/finalize
form. ``lift`` maps raw messages to *partial states* of a fixed width, so
partials can travel as ``array<double>`` Spark columns; ``merge`` combines
partial states (this is the step that must be commutative + associative);
``finalize`` maps a partial state to the aggregated value. The backends
exploit this decomposition for the paper's *partial-gather* strategy: a
first combine keyed by ``(dst, worker(src))`` on the sender side, a final
merge on the receiver.

:class:`GASLayer` is the computation-flow contract: ``scatter`` (what a
node sends), ``apply_edge`` (per-edge transform), ``aggregate`` (via the
aggregator, or ``union`` when the annotation rule forbids pre-reduction)
and ``apply_node``. All dense math runs through :mod:`repro.nn.autodiff`
Tensors so training and inference share one implementation.
"""
from __future__ import annotations

import numpy as np

from repro.nn.autodiff import Tensor

__all__ = ["Aggregator", "SumAgg", "MeanAgg", "MaxAgg", "UnionAgg", "GASLayer"]


class Aggregator:
    """Base class: a commutative + associative reduce in l/m/f form."""

    name: str = "base"

    def __init__(self, dim: int):
        self.dim = dim

    @property
    def partial_dim(self) -> int:
        """Width of a partial-state vector."""
        return self.dim

    def lift_segments(self, msgs: np.ndarray, seg: np.ndarray, n: int) -> np.ndarray:
        """Combine raw messages [m, dim] into one partial per segment."""
        raise NotImplementedError

    def merge_segments(self, partials: np.ndarray, seg: np.ndarray, n: int) -> np.ndarray:
        """Combine partial states [m, partial_dim] per segment."""
        raise NotImplementedError

    def finalize(self, partials: np.ndarray) -> np.ndarray:
        """Partial states [n, partial_dim] -> aggregated values [n, dim]."""
        raise NotImplementedError


def _seg_sum(x: np.ndarray, seg: np.ndarray, n: int) -> np.ndarray:
    out = np.zeros((n,) + x.shape[1:])
    np.add.at(out, seg, x)
    return out


class SumAgg(Aggregator):
    """Sum pooling. Partial = running sum."""

    name = "sum"

    def lift_segments(self, msgs, seg, n):
        return _seg_sum(msgs, seg, n)

    merge_segments = lift_segments

    def finalize(self, partials):
        return partials


class MeanAgg(Aggregator):
    """Mean pooling. Partial = (sum..., count); finalize divides."""

    name = "mean"

    @property
    def partial_dim(self) -> int:
        return self.dim + 1

    def lift_segments(self, msgs, seg, n):
        s = _seg_sum(msgs, seg, n)
        c = np.bincount(seg, minlength=n).astype(np.float64)
        return np.concatenate([s, c[:, None]], axis=1)

    def merge_segments(self, partials, seg, n):
        return _seg_sum(partials, seg, n)

    def finalize(self, partials):
        c = np.maximum(partials[:, -1:], 1.0)
        return partials[:, :-1] / c


class MaxAgg(Aggregator):
    """Max pooling. Empty destinations finalize to zeros."""

    name = "max"

    def lift_segments(self, msgs, seg, n):
        out = np.full((n, self.dim), -np.inf)
        np.maximum.at(out, seg, msgs)
        return out

    merge_segments = lift_segments

    def finalize(self, partials):
        return np.where(np.isfinite(partials), partials, 0.0)


class UnionAgg(Aggregator):
    """Marker aggregator for layers whose reduce breaks the
    commutative/associative rule (e.g. GAT attention): the *aggregate*
    stage just unions messages and the real reduction happens in
    ``apply_node`` (paper §IV-B). Not partial-gatherable."""

    name = "union"

    def lift_segments(self, msgs, seg, n):  # pragma: no cover - never combined
        raise RuntimeError("union aggregate cannot be pre-reduced")


class GASLayer:
    """One GNN layer in the GAS-like abstraction (computation flow only).

    Attributes double as the *annotations* the paper records in layer
    signature files:

    * ``partial`` — aggregate obeys the commutative + associative laws,
      so backends may combine it early (partial-gather / combiners).
    * ``broadcastable`` — ``scatter``'s message is identical across a
      node's out-edges, so the broadcast strategy applies.
    """

    kind: str = "gas"
    partial: bool = False
    broadcastable: bool = True

    def __init__(self, in_dim: int, out_dim: int):
        self.in_dim = in_dim
        self.out_dim = out_dim
        self.params: dict[str, Tensor] = {}
        self.aggregator: Aggregator = UnionAgg(in_dim)

    # -- computation flow -------------------------------------------------
    @property
    def msg_dim(self) -> int:
        """Payload width of scatter messages (post apply_edge)."""
        return self.in_dim

    def scatter(self, h: np.ndarray) -> np.ndarray:
        """Message a node emits on every out-edge (default: its state)."""
        return h

    def apply_edge(self, msg: np.ndarray, efeat: np.ndarray | None) -> np.ndarray:
        """Per-edge message transform (default: pass-through)."""
        return msg

    def apply_node(self, h_self: np.ndarray, aggr: np.ndarray) -> np.ndarray:
        """Update node states from aggregated messages (partial layers)."""
        raise NotImplementedError

    def apply_node_union(
        self, h_self: np.ndarray, msgs: np.ndarray, dst_idx: np.ndarray
    ) -> np.ndarray:
        """Update node states from unioned messages (non-partial layers).

        ``dst_idx`` maps each message row to a row of ``h_self``.
        """
        raise NotImplementedError

    # -- training / reference forward --------------------------------------
    def forward(
        self,
        h: Tensor,
        src: np.ndarray,
        dst: np.ndarray,
        efeat: np.ndarray | None = None,
    ) -> Tensor:
        """Differentiable full forward over an edge list (local tensors).

        This is the training-phase composition of the five stages on a
        locally available (sub)graph — exactly the paper's point that the
        computation flow is shared between training and inference.
        """
        raise NotImplementedError

    def signature(self) -> dict:
        """Layer annotation record (paper's per-layer signature file)."""
        return {
            "kind": self.kind,
            "in_dim": self.in_dim,
            "out_dim": self.out_dim,
            "partial": self.partial,
            "broadcastable": self.broadcastable,
            "aggregator": self.aggregator.name,
        }
