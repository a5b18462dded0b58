"""Benchmark fixtures: reuse the session-scoped SparkSession from the
top-level conftest and provide a results directory for the reproduced
tables (EXPERIMENTS.md points at these files)."""
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


def save_table(results_dir, name: str, df, title: str) -> None:
    """Persist one reproduced table both printable and machine-readable."""
    txt = results_dir / f"{name}.txt"
    txt.write_text(
        f"{title}\n\n"
        + df.to_string(index=False, float_format=lambda v: f"{v:.3f}")
        + "\n")
    df.to_csv(results_dir / f"{name}.csv", index=False)
