"""Optimization-strategy configuration (paper §IV-D).

Three strategies, all sampling-free and result-preserving:

* ``partial_gather`` — combine commutative/associative aggregates on the
  sender side, keyed ``(dst, worker(src))``; legal only for layers
  annotated ``partial=True``.
* ``broadcast`` — send one payload per ``(src, worker(dst))`` instead of
  one per out-edge; legal only for layers annotated ``broadcastable``.
* ``shadow_nodes`` — split out-degree hubs into mirrors before inference
  (see :mod:`repro.graphs.shadow`); threshold from the paper's heuristic
  ``λ·E/W`` with λ = 0.1.

Backends read layer annotations from the model signature, so an illegal
combination (e.g. partial-gather on GAT) silently degrades to the safe
path rather than corrupting results — exactly the paper's rule.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.graphs.shadow import DEFAULT_LAMBDA


@dataclass(frozen=True)
class StrategyConfig:
    """Which §IV-D strategies an inference run enables."""

    partial_gather: bool = False
    broadcast: bool = False
    shadow_nodes: bool = False
    shadow_lambda: float = DEFAULT_LAMBDA

    @staticmethod
    def none() -> "StrategyConfig":
        return StrategyConfig()

    @staticmethod
    def all() -> "StrategyConfig":
        return StrategyConfig(partial_gather=True, broadcast=True, shadow_nodes=True)
