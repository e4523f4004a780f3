"""Local dense full-graph forward — the ground truth for all backends.

The distributed backends (MapReduce, Pregel, and the k-hop baseline at
full fanout) must reproduce these logits bit-for-bit up to float
round-off; tests assert ``np.allclose(..., atol=1e-8)``. This module is
deliberately trivial: it just runs the shared computation flow on a
:class:`~repro.graphs.local.LocalGraph`.
"""
from __future__ import annotations

import numpy as np

from repro.core.model import GNNModel
from repro.graphs.local import LocalGraph


def forward_full(model: GNNModel, g: LocalGraph) -> np.ndarray:
    """Logits [n, C] of a full-graph forward pass (no sampling)."""
    return model.forward_local(g.feat, g.src, g.dst).data


def predict_full(model: GNNModel, g: LocalGraph) -> np.ndarray:
    """Hard predictions of a full-graph forward pass."""
    return model.predict(forward_full(model, g))


def embeddings_per_layer(model: GNNModel, g: LocalGraph) -> list[np.ndarray]:
    """Intermediate node states after each GAS layer (for round-by-round
    comparison against the distributed backends)."""
    from repro.nn.autodiff import Tensor

    h = Tensor(g.feat)
    out = []
    for layer in model.layers:
        h = layer.forward(h, g.src, g.dst)
        out.append(h.data.copy())
    return out
