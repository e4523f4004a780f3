"""Mini-batch training with k-hop neighbor sampling (paper §IV-B1).

The paper keeps the *traditional* training pipeline: sample the k-hop
neighborhood of a mini-batch of labeled nodes, run the GAS computation
flow on that local subgraph, and optimize with SGD-family methods. Only
inference switches to the full-graph pipeline. We do the same: training
runs on a :class:`~repro.graphs.local.LocalGraph` with per-batch k-hop
sampling and Adam, through the exact ``GASLayer.forward`` functions the
inference backends deploy.
"""
from __future__ import annotations

import numpy as np

from repro.core.model import GNNModel
from repro.graphs.local import LocalGraph
from repro.nn.autodiff import Tensor, bce_with_logits, softmax_cross_entropy
from repro.nn.optim import Adam


def train_model(
    model: GNNModel,
    g: LocalGraph,
    *,
    epochs: int = 20,
    batch_size: int = 64,
    fanout: int = 10,
    lr: float = 1e-2,
    seed: int = 0,
) -> list[float]:
    """Train ``model`` on ``g``'s train split; returns per-epoch losses."""
    if g.labels is None or g.split is None:
        raise ValueError("training requires labels and a split column")
    rng = np.random.default_rng(seed)
    train_ids = np.flatnonzero(g.mask("train"))
    opt = Adam(model.parameters(), lr=lr)
    hops = model.n_layers
    history: list[float] = []
    for _ in range(epochs):
        rng.shuffle(train_ids)
        losses = []
        for start in range(0, len(train_ids), batch_size):
            batch = train_ids[start : start + batch_size]
            node_ids, lsrc, ldst = g.sample_khop(batch, hops=hops, fanout=fanout, rng=rng)
            pos = np.searchsorted(node_ids, batch)
            logits = model.forward_local(g.feat[node_ids], lsrc, ldst)
            from repro.nn.autodiff import gather_rows

            batch_logits = gather_rows(logits, pos)
            if model.task == "multilabel":
                loss = bce_with_logits(batch_logits, g.labels[batch])
            else:
                loss = softmax_cross_entropy(batch_logits, g.labels[batch])
            opt.zero_grad()
            loss.backward()
            opt.step()
            losses.append(float(loss.data))
        history.append(float(np.mean(losses)))
    return history


def full_batch_loss(model: GNNModel, g: LocalGraph, mask_name: str = "train") -> float:
    """Loss of a full-graph forward on one split (diagnostics/tests)."""
    logits = model.forward_local(g.feat, g.src, g.dst)
    mask = np.flatnonzero(g.mask(mask_name))
    from repro.nn.autodiff import gather_rows

    sub = gather_rows(logits, mask)
    if model.task == "multilabel":
        return float(bce_with_logits(sub, g.labels[mask]).data)
    return float(softmax_cross_entropy(sub, g.labels[mask]).data)
