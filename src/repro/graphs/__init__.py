"""Graph data substrate: synthetic generators, local views, preprocessing.

The paper evaluates on PPI / OGB-Products / MAG240M / a synthetic
Power-Law graph. None of those are available offline, so this package
provides deterministic synthetic stand-ins (see DESIGN.md §2) plus the
graph-side preprocessing the paper needs (shadow-nodes) and the summary
statistics behind Table I.
"""
from repro.graphs.generators import power_law_graph, uniform_graph  # noqa: F401
from repro.graphs.local import LocalGraph  # noqa: F401
