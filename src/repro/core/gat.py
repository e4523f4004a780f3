"""GAT convolution in the GAS-like abstraction (paper Fig. 3, right).

Attention breaks the commutative/associative rule, so per the paper's
annotation rule the *aggregate* stage only unions messages
(``partial=False``) and the softmax-weighted reduction happens inside
``apply_node``. Messages are raw source states (``W·h`` is computed on
the receiver), so messages are identical across out-edges and the layer
stays ``broadcastable``.

A self-loop is added implicitly (standard GAT practice); in the
distributed backends the "message to itself" is exactly the node's own
state, which both backends already deliver.
"""
from __future__ import annotations

import numpy as np

from repro.core.gas import GASLayer
from repro.nn.autodiff import Tensor, concat, gather_rows, segment_softmax, segment_sum


class GATConv(GASLayer):
    """Multi-head graph attention layer (heads concatenated)."""

    kind = "gat"
    partial = False
    broadcastable = True

    def __init__(
        self,
        in_dim: int,
        out_dim: int,
        *,
        heads: int = 2,
        act: str = "elu",
        leaky: float = 0.2,
        rng: np.random.Generator | None = None,
    ):
        if out_dim % heads:
            raise ValueError("out_dim must be divisible by heads")
        super().__init__(in_dim, out_dim)
        self.heads = heads
        self.head_dim = out_dim // heads
        self.act = act
        self.leaky = leaky
        rng = rng or np.random.default_rng(0)
        scale = 1.0 / np.sqrt(in_dim)
        self.params = {
            "w": Tensor(rng.standard_normal((in_dim, out_dim)) * scale, True),
            "a_src": Tensor(rng.standard_normal((heads, self.head_dim)) * scale, True),
            "a_dst": Tensor(rng.standard_normal((heads, self.head_dim)) * scale, True),
            "b": Tensor(np.zeros(out_dim), True),
        }

    def _act(self, t: Tensor) -> Tensor:
        return t.elu() if self.act == "elu" else t

    def _attend(
        self, h_all: Tensor, src: np.ndarray, dst_rows: np.ndarray, seg: np.ndarray, n: int
    ) -> Tensor:
        """Shared attention core over rows of ``h_all`` ([m, in_dim]).

        Per attention edge ``i``: the source state is row ``src[i]`` of
        ``h_all``, the destination state is row ``dst_rows[i]``, and the
        softmax segment / output row is ``seg[i]`` in ``0..n-1``. (In the
        local forward, node rows coincide with output rows so
        ``dst_rows == seg``; in the distributed union path destination
        states are stacked after the message rows, so they differ.)
        Self-loop edges must already be included by the caller.
        """
        p = self.params
        z = (h_all @ p["w"]).reshape(-1, self.heads, self.head_dim)  # [m, H, dh]
        s_src = (z * p["a_src"]).sum(axis=2)  # [m, H]
        s_dst = (z * p["a_dst"]).sum(axis=2)  # [m, H]
        e = (gather_rows(s_src, src) + gather_rows(s_dst, dst_rows)).leaky_relu(self.leaky)
        alpha = segment_softmax(e, seg, n)  # [E, H]
        weighted = gather_rows(z, src) * alpha.reshape(-1, self.heads, 1)
        out = segment_sum(weighted, seg, n).reshape(n, self.out_dim)
        return self._act(out + p["b"])

    # -- inference stage (NumPy in / NumPy out) ------------------------------
    def apply_node_union(
        self, h_self: np.ndarray, msgs: np.ndarray, dst_idx: np.ndarray
    ) -> np.ndarray:
        """Attention over unioned in-edge messages plus the self-loop.

        ``h_self``: [n, in_dim] destination states; ``msgs``: [e, in_dim]
        message payloads; ``dst_idx``: [e] destination row per message.
        """
        n = h_self.shape[0]
        m = msgs.shape[0]
        h_all = Tensor(np.concatenate([msgs, h_self], axis=0))
        src = np.arange(m + n, dtype=np.int64)  # each stacked row is one message
        seg = np.concatenate([np.asarray(dst_idx, np.int64), np.arange(n, dtype=np.int64)])
        return self._attend(h_all, src, m + seg, seg, n).data

    # -- training / reference forward -----------------------------------------
    def forward(self, h: Tensor, src, dst, efeat=None) -> Tensor:
        n = h.data.shape[0]
        src = np.concatenate([np.asarray(src, np.int64), np.arange(n, dtype=np.int64)])
        dst = np.concatenate([np.asarray(dst, np.int64), np.arange(n, dtype=np.int64)])
        return self._attend(h, src, dst, dst, n)

    def signature(self) -> dict:
        return {
            **super().signature(),
            "heads": self.heads,
            "act": self.act,
            "leaky": self.leaky,
        }
