"""Multi-layer GNN models: composition, serialization, signature files.

A :class:`GNNModel` is a stack of :class:`~repro.core.gas.GASLayer` plus a
dense prediction head. Saving a model writes two artifacts, mirroring the
paper's deployment flow (§IV-B1):

* ``weights.npz`` — all parameter arrays, keyed ``layer{i}.{name}`` /
  ``head.{name}``;
* ``signature.json`` — the layer-wise signature file: per-layer stage
  annotations (``partial``, ``broadcastable``, aggregator, dims) that the
  inference backends load to decide which optimization strategies are
  legal, "to avoid excessive manual configurations".
"""
from __future__ import annotations

import json
from pathlib import Path

import numpy as np

from repro.core.gas import GASLayer
from repro.core.gat import GATConv
from repro.core.sage import SAGEConv
from repro.nn.autodiff import Tensor


class Dense:
    """Linear prediction head: ``logits = h·W + b``."""

    def __init__(self, in_dim: int, out_dim: int, rng: np.random.Generator | None = None):
        rng = rng or np.random.default_rng(0)
        self.in_dim, self.out_dim = in_dim, out_dim
        self.params = {
            "w": Tensor(rng.standard_normal((in_dim, out_dim)) / np.sqrt(in_dim), True),
            "b": Tensor(np.zeros(out_dim), True),
        }

    def __call__(self, h: Tensor) -> Tensor:
        return h @ self.params["w"] + self.params["b"]


class GNNModel:
    """A k-layer GNN = k GAS layers + prediction head.

    ``task`` is ``"multiclass"`` (softmax/argmax) or ``"multilabel"``
    (per-class sigmoid/threshold).
    """

    def __init__(self, layers: list[GASLayer], head: Dense, task: str = "multiclass"):
        if task not in ("multiclass", "multilabel"):
            raise ValueError(f"unknown task {task!r}")
        self.layers = layers
        self.head = head
        self.task = task

    @property
    def n_layers(self) -> int:
        return len(self.layers)

    # -- shared computation flow (training AND local reference) ------------
    def forward_local(self, feat: np.ndarray | Tensor, src, dst) -> Tensor:
        """Full forward over a locally available edge list → logits."""
        h = feat if isinstance(feat, Tensor) else Tensor(np.asarray(feat, dtype=np.float64))
        for layer in self.layers:
            h = layer.forward(h, src, dst)
        return self.head(h)

    def predict(self, logits: np.ndarray) -> np.ndarray:
        """Logits → hard predictions per the task type."""
        if self.task == "multilabel":
            return (logits > 0).astype(np.int64)
        return logits.argmax(axis=1).astype(np.int64)

    def parameters(self) -> dict[str, Tensor]:
        out: dict[str, Tensor] = {}
        for i, layer in enumerate(self.layers):
            for k, p in layer.params.items():
                out[f"layer{i}.{k}"] = p
        for k, p in self.head.params.items():
            out[f"head.{k}"] = p
        return out

    # -- signature + weights -------------------------------------------------
    def signature(self) -> dict:
        return {
            "task": self.task,
            "layers": [layer.signature() for layer in self.layers],
            "head": {"in_dim": self.head.in_dim, "out_dim": self.head.out_dim},
        }

    def save(self, path: str | Path) -> None:
        path = Path(path)
        path.mkdir(parents=True, exist_ok=True)
        (path / "signature.json").write_text(json.dumps(self.signature(), indent=2))
        np.savez(path / "weights.npz", **{k: p.data for k, p in self.parameters().items()})

    @staticmethod
    def load(path: str | Path) -> "GNNModel":
        path = Path(path)
        sig = json.loads((path / "signature.json").read_text())
        layers: list[GASLayer] = []
        for ls in sig["layers"]:
            if ls["kind"] == "sage":
                layers.append(
                    SAGEConv(ls["in_dim"], ls["out_dim"], agg=ls["aggregator"], act=ls["act"])
                )
            elif ls["kind"] == "gat":
                layers.append(
                    GATConv(
                        ls["in_dim"],
                        ls["out_dim"],
                        heads=ls["heads"],
                        act=ls["act"],
                        leaky=ls["leaky"],
                    )
                )
            else:  # pragma: no cover - guarded by save()
                raise ValueError(f"unknown layer kind {ls['kind']!r}")
        head = Dense(sig["head"]["in_dim"], sig["head"]["out_dim"])
        model = GNNModel(layers, head, task=sig["task"])
        weights = np.load(path / "weights.npz")
        for k, p in model.parameters().items():
            p.data = weights[k]
        return model


def build_sage(
    in_dim: int,
    hidden: int,
    n_classes: int,
    *,
    n_layers: int = 2,
    agg: str = "mean",
    task: str = "multiclass",
    seed: int = 0,
) -> GNNModel:
    """Standard GraphSAGE stack: (in→hidden)×1, (hidden→hidden)×(k-1), head."""
    rng = np.random.default_rng(seed)
    dims = [in_dim] + [hidden] * n_layers
    layers = [
        SAGEConv(dims[i], dims[i + 1], agg=agg, rng=rng) for i in range(n_layers)
    ]
    return GNNModel(layers, Dense(hidden, n_classes, rng=rng), task=task)


def build_gat(
    in_dim: int,
    hidden: int,
    n_classes: int,
    *,
    n_layers: int = 2,
    heads: int = 2,
    task: str = "multiclass",
    seed: int = 0,
) -> GNNModel:
    """Standard GAT stack with concatenated heads and a dense head."""
    rng = np.random.default_rng(seed)
    dims = [in_dim] + [hidden] * n_layers
    layers = [
        GATConv(dims[i], dims[i + 1], heads=heads, rng=rng) for i in range(n_layers)
    ]
    return GNNModel(layers, Dense(hidden, n_classes, rng=rng), task=task)
