"""Benchmark scale factor (override with REPRO_BENCH_SF) and result
persistence: each bench writes its reproduced table to
``benchmarks/results/tableN.md`` (pytest captures stdout, so the rows
must survive somewhere inspectable)."""
import os
from pathlib import Path

import pytest

from repro.bench.tables import to_markdown


@pytest.fixture(scope="session")
def bench_sf() -> float:
    return float(os.environ.get("REPRO_BENCH_SF", "0.5"))


@pytest.fixture(scope="session")
def save_table():
    def _save(name: str, df, header: str) -> str:
        md = to_markdown(df)
        out = Path(__file__).parent / "results"
        out.mkdir(exist_ok=True)
        (out / f"{name}.md").write_text(f"{header}\n\n{md}\n")
        print(f"\n{header}\n{md}")
        return md

    return _save
