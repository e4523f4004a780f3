"""Table I benchmark: dataset generation + summary at bench scale."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))

import table1_datasets  # noqa: E402


def test_bench_table1(spark, benchmark, save_rows):
    rows = benchmark.pedantic(
        lambda: table1_datasets.run(spark, scale=1.0, pl_nodes=100_000),
        rounds=1,
        iterations=1,
    )
    save_rows("table1", rows)
    by_name = {r["dataset"]: r for r in rows}
    # the Power-Law bench graph mirrors the strategy-analysis scale
    assert by_name["power_law"]["#Node"] == 100_000
    assert by_name["power_law"]["#Edge"] > 800_000
    # skew present: hubs far above the mean degree
    assert by_name["power_law"]["max_in"] > 100
    assert by_name["ppi_lite"]["#Node"] == 1500
