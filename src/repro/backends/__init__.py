"""Inference backends.

* :mod:`repro.backends.mapreduce` — the batch-processing (MapReduce/
  Spark) backend: node state round-trips through external storage
  (Parquet) between layers.
* :mod:`repro.backends.pregel` — the Pregel-like graph-processing
  backend: vertex state + out-adjacency stay resident and co-partitioned
  across supersteps; only messages shuffle; combiners supported.
* :mod:`repro.backends.khop` — the *traditional* pipeline baseline
  (PyG/DGL stand-in): sampled k-hop neighborhood construction plus
  per-target localized forward, with all its redundant computation.

Both InferTurbo backends share the GAS data-flow machinery in
:mod:`repro.backends.common` and produce bit-identical results.
"""
from repro.backends.common import N_WORKERS, RunStats  # noqa: F401
