"""The jobs/ entrypoints run end-to-end (with the session fixture) and
print the expected headline numbers."""
import runpy
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"


@pytest.fixture(autouse=True)
def _jobs_on_path():
    sys.path.insert(0, str(JOBS))
    yield
    sys.path.remove(str(JOBS))


class TestFigureJobs:
    @pytest.mark.parametrize(
        "fig", ["fig11", "fig12", "fig13", "fig14", "fig15"]
    )
    def test_print_figure(self, fig, capsys):
        from figures import print_figure

        print_figure(fig)
        out = capsys.readouterr().out
        assert "geo-mean cost/BL" in out
        assert out.count("| 9 |") >= 1  # ten sets per panel


class TestExampleJobs:
    def test_example6(self, spark, capsys):
        mod = runpy.run_path(str(JOBS / "example6.py"))
        mod["run"](spark)
        out = capsys.readouterr().out
        assert "C'  = 150" in out
        assert "rewritten == baseline rows: True" in out

    def test_example7(self, spark, capsys):
        mod = runpy.run_path(str(JOBS / "example7.py"))
        mod["run"](spark)
        out = capsys.readouterr().out
        assert "C''   = 150" in out
        assert "== baseline rows: True" in out

    def test_table1(self, spark, capsys):
        mod = runpy.run_path(str(JOBS / "table1.py"))
        mod["run"](spark)
        out = capsys.readouterr().out
        assert out.count("== baseline rows: True") == 4

    def test_exec_compare_small(self, spark, capsys):
        mod = runpy.run_path(str(JOBS / "exec_compare.py"))
        timings = mod["run"](spark, horizon=240, eta=5)
        assert set(timings) == {"BL", "WCG", "WCG-FW"}
