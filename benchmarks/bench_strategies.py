"""§V-B2 benchmark: strategy IO reductions at the paper's analysis scale
(paper: 100M nodes / 1.4B edges; locally 20k nodes / ~280k edges with
the same power-law shape and λ=0.1 threshold heuristic).

Shape to reproduce: partial-gather cuts total AND tail IO on in-skewed
graphs; broadcast and shadow-nodes cut tail IO and variance on
out-skewed graphs.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))

import strategy_analysis  # noqa: E402


def _pct(s: str) -> float:
    return float(s.rstrip("%"))


def test_bench_strategies(spark, benchmark, save_rows):
    rows = benchmark.pedantic(
        lambda: strategy_analysis.run(spark, n_nodes=20_000, avg_degree=14),
        rounds=1,
        iterations=1,
    )
    save_rows("strategies", rows)
    pg, bc, sn = rows
    assert _pct(pg["total reduction"]) > 10  # paper: ~25%
    assert _pct(pg["tail-10% reduction"]) > 30  # paper: ~73%
    assert _pct(bc["tail-10% reduction"]) > 20  # paper: ~42%
    assert _pct(sn["tail-10% reduction"]) > 20  # paper: ~53%
    # skew mitigation: per-worker variance shrinks under every strategy
    for r in rows:
        assert r["worker variance ratio"] < 1.0
