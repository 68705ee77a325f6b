"""Smoke tests: every jobs/ entrypoint runs and prints its table."""
import runpy
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"
sys.path.insert(0, str(JOBS))


def _load(name):
    return runpy.run_path(str(JOBS / name))


class TestDriverJobs:
    def test_table6_quick(self, capsys):
        mod = _load("table6_init_costs.py")
        assert mod["main"](["--quick"]) == 0
        out = capsys.readouterr().out
        assert "Table 6" in out and "NGC_ms" in out

    def test_table7_quick(self, capsys):
        mod = _load("table7_learning_time.py")
        # tiny scale through the module's run() to keep the test fast
        from repro.experiments import table7
        from repro.experiments.common import render_table

        rows = table7.run(n_values=[2000], ell=10, n_learn=40, delta=64,
                          h=3, sample_rate=5e-2, lbmc_episodes=2)
        print(render_table("Table 7 — SFC learning time (seconds)", rows))
        out = capsys.readouterr().out
        assert "BMTree_s" in out and "LBMC_s" in out
        assert mod["main"] is not None

    def test_cost_efficiency_single_sweep(self, capsys):
        mod = _load("cost_efficiency.py")
        assert mod["main"](["--sweep", "d"]) == 0
        assert "gain_LC" in capsys.readouterr().out

    def test_bmtree_variants_help(self):
        mod = _load("bmtree_variants.py")
        with pytest.raises(SystemExit):
            mod["main"](["--figure", "bogus"])

    def test_block_access_fig14_small(self, capsys):
        from repro.experiments import fig14_17
        from repro.experiments.common import render_table

        rows = fig14_17.overall(datasets=("UNI",), n_pts=2000, ell=10,
                                n_learn=20, n_test=20, delta=64, block_size=32)
        print(render_table("Fig 14", rows))
        out = capsys.readouterr().out
        assert "LBMC" in out
        assert _load("block_access.py")["main"] is not None


class TestLayoutDemo:
    def test_run_end_to_end(self, spark, tmp_path):
        mod = _load("layout_demo.py")
        best, scores, stats = mod["run"](
            spark, n_pts=5_000, ell=10, out_dir=str(tmp_path)
        )
        assert best.d == 2 and best.ell == 10
        assert stats.n_files >= 1
        assert stats.avg_files_touched <= stats.n_files
        # the chosen curve has the minimum estimated cost
        assert min(c for _, c in scores) == dict((s.slots, c) for s, c in scores)[best.slots]
