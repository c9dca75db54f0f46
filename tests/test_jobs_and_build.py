"""Smoke coverage for the spark-submit entrypoints and the offline build
backend (neither runs a full job — benches cover the heavy paths)."""
import importlib.util
import pathlib
import sys
import zipfile

import pytest

ROOT = pathlib.Path(__file__).resolve().parents[1]
JOB_FILES = sorted(p for p in (ROOT / "jobs").glob("*.py") if p.name != "_common.py")


def _load(path: pathlib.Path):
    spec = importlib.util.spec_from_file_location(f"job_{path.stem}", path)
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


class TestJobs:
    def test_one_job_per_table(self):
        names = {p.stem for p in JOB_FILES}
        for n in range(2, 12):
            assert f"table{n:02d}" in names, f"missing job for Table {n}"
        for extra in ("optassign_job", "gpart_job", "compredict_job", "scope_pipeline"):
            assert extra in names

    @pytest.mark.parametrize("path", JOB_FILES, ids=lambda p: p.stem)
    def test_job_importable_with_main(self, path):
        mod = _load(path)
        assert callable(mod.main)

    def test_common_show_formats(self, capsys):
        import pandas as pd

        sys.path.insert(0, str(ROOT / "jobs"))
        try:
            from _common import show
        finally:
            sys.path.pop(0)
        show("t", pd.DataFrame({"a": [1]}), pd.DataFrame({"a": [2]}))
        out = capsys.readouterr().out
        assert "paper" in out and "reproduction" in out


class TestBuildBackend:
    def test_editable_wheel_contains_pth(self, tmp_path):
        sys.path.insert(0, str(ROOT))
        try:
            import _build_backend as bb
        finally:
            sys.path.pop(0)
        name = bb.build_editable(str(tmp_path))
        with zipfile.ZipFile(tmp_path / name) as z:
            names = z.namelist()
            assert "repro.pth" in names
            assert any(n.endswith("RECORD") for n in names)
            pth = z.read("repro.pth").decode().strip()
            assert pth.endswith("src")

    def test_wheel_contains_package(self, tmp_path):
        sys.path.insert(0, str(ROOT))
        try:
            import _build_backend as bb
        finally:
            sys.path.pop(0)
        name = bb.build_wheel(str(tmp_path))
        with zipfile.ZipFile(tmp_path / name) as z:
            names = z.namelist()
            assert "repro/__init__.py" in names
            assert "repro/core/optassign.py" in names
