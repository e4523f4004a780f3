"""Benchmark-local helpers: persist each table's rows as JSON + markdown
under ``bench_results/`` so EXPERIMENTS.md can be assembled from a run."""
import json
from pathlib import Path

import pytest

RESULTS_DIR = Path(__file__).resolve().parents[1] / "bench_results"


@pytest.fixture(scope="session")
def save_rows():
    RESULTS_DIR.mkdir(exist_ok=True)

    def _save(name: str, rows: list[dict]) -> None:
        (RESULTS_DIR / f"{name}.json").write_text(json.dumps(rows, indent=2, default=str))
        cols = list(rows[0].keys())
        lines = [
            "| " + " | ".join(cols) + " |",
            "|" + "|".join("---" for _ in cols) + "|",
        ] + ["| " + " | ".join(str(r[c]) for c in cols) + " |" for r in rows]
        (RESULTS_DIR / f"{name}.md").write_text("\n".join(lines) + "\n")
        print(f"\n[{name}]")
        for line in lines:
            print(line)

    return _save
