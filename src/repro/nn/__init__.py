"""Minimal NumPy deep-learning substrate.

The paper trains GNNs with PyTorch-backed systems (PyG/DGL). PyTorch is
not available offline, so we implement the required subset ourselves:

* :mod:`repro.nn.autodiff` — a small reverse-mode autodiff engine over
  NumPy arrays, with the segment (scatter/gather) operations GNNs need.
* :mod:`repro.nn.optim` — SGD and Adam optimizers over parameter dicts.

Training uses the autodiff Tensors; distributed inference uses plain
NumPy stage functions operating on the same weight arrays (equivalence
of the two forward passes is covered by tests).
"""
from repro.nn.autodiff import Tensor  # noqa: F401
from repro.nn.optim import SGD, Adam  # noqa: F401
