"""Sanity tests for the spark-submit job entrypoints (import-level)."""
import ast
import pathlib

import pytest

JOBS = sorted(
    p for p in (pathlib.Path(__file__).parent.parent / "jobs").glob("*.py")
    if not p.name.startswith("_")
)


def test_one_job_per_table():
    names = {p.stem for p in JOBS}
    for t in range(1, 7):
        assert any(n.startswith(f"table{t}") for n in names), f"missing job for table {t}"
    assert "token_matching" in names


@pytest.mark.parametrize("path", JOBS, ids=lambda p: p.stem)
def test_job_parses_and_is_guarded(path):
    tree = ast.parse(path.read_text())
    # every job must guard session creation behind __main__ so importing
    # it (e.g. by tooling) never launches a JVM
    guards = [
        n
        for n in tree.body
        if isinstance(n, ast.If)
        and isinstance(n.test, ast.Compare)
        and getattr(n.test.left, "id", "") == "__name__"
    ]
    assert guards, f"{path.name} missing __main__ guard"


@pytest.mark.parametrize("path", JOBS, ids=lambda p: p.stem)
def test_job_references_existing_harness(path):
    src = path.read_text()
    assert "from repro.tables" in src
    assert "save(" in src  # persists results/ for EXPERIMENTS.md
