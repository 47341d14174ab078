"""Benchmark helpers: run each experiment once (they are end-to-end
measurements, not microbenchmarks) and persist its table to results/."""
from pathlib import Path

import pandas as pd
import pytest

RESULTS = Path(__file__).resolve().parents[1] / "results"


@pytest.fixture
def run_table(benchmark):
    """Benchmark an experiment function once and save its table as CSV."""

    def _run(name: str, fn, *args, **kwargs):
        RESULTS.mkdir(exist_ok=True)
        out = benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
        df = out[0] if isinstance(out, tuple) else out
        assert isinstance(df, pd.DataFrame) and len(df) > 0
        df.to_csv(RESULTS / f"{name}.csv", index=False)
        return df

    return _run
