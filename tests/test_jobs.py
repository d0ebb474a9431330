"""Job entrypoints: importable, wired to the right drivers."""
import importlib.util
import os
import sys

import pytest

JOBS = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "jobs")


def _load(name):
    sys.path.insert(0, JOBS)
    try:
        spec = importlib.util.spec_from_file_location(name, os.path.join(JOBS, f"{name}.py"))
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.remove(JOBS)


@pytest.mark.parametrize("name,target", [
    ("table1", "run_table1"),
    ("table2", "run_table2"),
    ("table3", "run_table3"),
])
def test_job_modules_import_without_running(name, target):
    mod = _load(name)
    # __main__ guard means import must not launch Spark.
    assert hasattr(mod, "run_job")


def test_common_run_job_writes_output(tmp_path, monkeypatch, spark):
    """run_job parses args, invokes the runner, prints and persists."""
    sys.path.insert(0, JOBS)
    try:
        import _common
    finally:
        sys.path.remove(JOBS)
    out = tmp_path / "t.md"
    calls = {}

    def fake_runner(s, scale):
        calls["scale"] = scale
        return "| a |\n|---|\n| 1 |", None

    # Avoid stopping the shared test session: run_job calls spark.stop();
    # patch get_spark to hand out a throwaway object with a stop() no-op.
    class FakeSpark:
        def stop(self):
            calls["stopped"] = True

    monkeypatch.setattr(_common, "get_spark", lambda app: FakeSpark())
    monkeypatch.setattr(sys, "argv", ["x", "--scale", "test", "--out", str(out)])
    _common.run_job("Table T", lambda s, scale: fake_runner(s, scale))
    assert calls == {"scale": "test", "stopped": True}
    assert "| 1 |" in out.read_text()
