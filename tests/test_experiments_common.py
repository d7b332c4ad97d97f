"""ExperimentResult formatting/persistence used by every table harness."""
import json

import pytest

from repro.experiments.common import RESULTS_DIR, ExperimentResult


@pytest.fixture()
def result():
    return ExperimentResult(
        "T0", "smoke", rows=[{"a": 1, "b": 2.5}, {"a": 10, "b": None}],
        notes=["hello"],
    )


class TestFormat:
    def test_header_and_rows(self, result):
        out = result.format()
        lines = out.splitlines()
        assert lines[0] == "== T0: smoke =="
        assert lines[1].split() == ["a", "b"]
        assert "2.500" in lines[2]
        assert "-" in lines[3]  # None renders as '-'
        assert lines[-1] == "note: hello"

    def test_empty(self):
        out = ExperimentResult("T0", "empty").format()
        assert "(no rows)" in out

    def test_alignment(self, result):
        lines = result.format().splitlines()
        # all data lines align to the header width
        assert len(lines[2]) <= len(lines[1]) + 8


class TestSave:
    def test_roundtrip(self, result, tmp_path, monkeypatch):
        monkeypatch.setattr(
            "repro.experiments.common.RESULTS_DIR", tmp_path
        )
        path = result.save()
        assert path.name == "t0.json"
        data = json.loads(path.read_text())
        assert data["rows"][0]["a"] == 1
        assert data["notes"] == ["hello"]

    def test_results_dir_is_repo_level(self):
        assert RESULTS_DIR.name == "results"
        assert (RESULTS_DIR.parent / "pyproject.toml").exists()
