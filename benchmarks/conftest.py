"""Benchmark-local fixtures: print the reproduced table so bench output
doubles as the EXPERIMENTS.md data source."""
import pandas as pd
import pytest


@pytest.fixture
def emit_table(capsys):
    def _emit(title: str, df: pd.DataFrame) -> None:
        pd.set_option("display.width", 220)
        with capsys.disabled():
            print(f"\n== {title} ==")
            print(df.to_string(index=False))

    return _emit
