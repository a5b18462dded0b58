"""Smoke tests for the spark-submit job entrypoints: importable, and
their paper-number tables are complete and consistent with the method
registry."""
import importlib.util
import pathlib
import sys

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def _load(name):
    sys.path.insert(0, str(JOBS))
    try:
        spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.pop(0)


@pytest.mark.parametrize("job", ["table3", "table4", "fig4", "fig5",
                                 "fig6", "fig7"])
def test_job_importable_with_main(job):
    mod = _load(job)
    assert callable(mod.main)


def test_table3_paper_numbers_complete():
    mod = _load("table3")
    assert len(mod.PAPER) == 7
    for vals in mod.PAPER.values():
        assert len(vals) == 3
        assert all(0 <= v <= 1 for v in vals)


def test_table4_paper_numbers_ordered_as_paper():
    mod = _load("table4")
    assert mod.PAPER["COMA Schema-based"] < mod.PAPER["Cupid"]
    assert mod.PAPER["EmbDI"] == max(mod.PAPER.values())


def test_paper_labels_match_registry():
    from repro.suite.experiments import METHOD_LABELS
    mod = _load("table3")
    assert set(mod.PAPER) <= set(METHOD_LABELS.values())
