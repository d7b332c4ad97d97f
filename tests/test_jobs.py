"""jobs/ entrypoints: importable, documented, correct arg plumbing."""
import importlib.util
import pathlib
import subprocess
import sys

import pytest

JOBS = sorted(
    (pathlib.Path(__file__).resolve().parents[1] / "jobs").glob("t*.py")
)


def _load(path):
    spec = importlib.util.spec_from_file_location(path.stem, path)
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.parametrize("path", JOBS, ids=[p.stem for p in JOBS])
def test_job_importable_with_main(path):
    mod = _load(path)
    assert callable(mod.main)
    assert mod.__doc__ and "spark-submit" in mod.__doc__


def test_one_job_per_table():
    names = {p.stem.split("_")[0] for p in JOBS}
    assert names == {f"t{i}" for i in range(1, 12)}


@pytest.mark.parametrize("path", JOBS, ids=[p.stem for p in JOBS])
def test_job_help_runs(path):
    """--help must work without touching Spark (argparse exits first)."""
    out = subprocess.run(
        [sys.executable, str(path), "--help"],
        capture_output=True, text=True, timeout=120,
    )
    assert out.returncode == 0
    assert "usage" in out.stdout.lower()
