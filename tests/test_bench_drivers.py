"""Table drivers (bench/table1-4): structure, invariants, and the
paper-shape assertions the reproduction defends at tiny scale."""
import numpy as np
import pytest

from repro.bench.harness import Timer, fit_loglog_slope, fmt_table, mb, save_results
from repro.bench.table1 import CLAIMED, METHODS, run_cell as t1_cell, run_table1
from repro.bench.table2 import graph_stats, run_table2
from repro.bench.table3 import FRAMEWORKS, run_cell as t3_cell, run_table3, speedups
from repro.bench.table4 import KINDS, run_table4


class TestHarness:
    def test_timer(self):
        with Timer() as t:
            sum(range(1000))
        assert t.seconds >= 0

    def test_mb(self):
        assert mb(1 << 20) == 1.0

    def test_fmt_table_aligns(self):
        out = fmt_table(["a", "bb"], [["x", 1], ["yy", 22]])
        lines = out.splitlines()
        assert len(lines) == 4
        assert len(set(len(l) for l in lines)) == 1

    def test_fit_loglog_slope_linear(self):
        xs = [10, 100, 1000]
        assert fit_loglog_slope(xs, [2 * x for x in xs]) == pytest.approx(1.0)

    def test_fit_loglog_slope_constant(self):
        assert fit_loglog_slope([10, 100, 1000], [5, 5, 5]) == pytest.approx(0.0)

    def test_save_results(self, tmp_path, monkeypatch):
        import repro.bench.harness as h

        monkeypatch.setattr(h, "RESULTS_DIR", tmp_path)
        p = h.save_results("x", {"a": 1})
        assert p.read_text() == '{\n  "a": 1\n}'


class TestTable1Driver:
    def test_cell_fields(self):
        r = t1_cell("bingo", 64, n_ops=20, n_draws=30, seed=1)
        assert r["method"] == "bingo" and r["d"] == 64
        assert r["insert_us"] > 0 and r["sample_us"] > 0 and r["bytes"] > 0

    def test_all_methods_run(self):
        for m in METHODS:
            t1_cell(m, 32, n_ops=10, n_draws=10, seed=2)

    def test_claimed_covers_methods(self):
        assert set(CLAIMED) == set(METHODS)

    def test_sweep_slopes_shape(self):
        res = run_table1(degrees=(32, 128), n_ops=20, n_draws=30, seed=3)
        assert len(res["rows"]) == 2 * len(METHODS)
        assert set(res["slopes"]) == set(METHODS)

    def test_alias_update_scales_bingo_does_not(self):
        # The Table 1 headline at two decades of degree: alias updates
        # grow ~linearly, BINGO's stay flat.
        res = run_table1(degrees=(64, 4096), n_ops=60, n_draws=30, seed=4)
        assert res["slopes"]["alias"]["insert"] > 0.5
        assert res["slopes"]["bingo"]["insert"] < 0.35
        assert res["slopes"]["bingo"]["sample"] < 0.35

    def test_reservoir_sampling_scales(self):
        res = run_table1(degrees=(64, 4096), n_ops=20, n_draws=60, seed=5)
        assert res["slopes"]["reservoir"]["sample"] > 0.3


class TestTable2Driver:
    def test_stats_fields(self):
        r = graph_stats("AM")
        assert r["vertices"] > 0 and r["edges"] > 0
        assert r["paper_vertices"] == "403.4K"

    def test_suite_complete(self):
        res = run_table2()
        assert [r["abbr"] for r in res["rows"]] == ["AM", "GO", "CT", "LJ", "TW"]

    def test_spark_and_pandas_agree(self, spark):
        a = graph_stats("AM")
        b = graph_stats("AM", spark=spark)
        assert a == b


class TestTable3Driver:
    @pytest.mark.parametrize("framework", FRAMEWORKS)
    def test_cell_runs(self, framework):
        r = t3_cell("AM", "deepwalk", "mixed", framework,
                    rounds=2, batch_size=50, walkers=32, length=5, seed=6)
        assert r["runtime_s"] > 0 and r["memory_mb"] > 0
        assert r["runtime_s"] == pytest.approx(
            r["update_s"] + r["walk_s"], rel=1e-6
        )

    def test_ppr_cell(self):
        r = t3_cell("AM", "ppr", "insertion", "bingo",
                    rounds=1, batch_size=50, walkers=16, length=5, seed=7)
        assert r["runtime_s"] > 0

    def test_node2vec_cell(self):
        r = t3_cell("AM", "node2vec", "deletion", "flowwalker",
                    rounds=1, batch_size=50, walkers=16, length=5, seed=8)
        assert r["runtime_s"] > 0

    def test_speedups_relative_to_bingo(self):
        rows = [
            {"app": "a", "mode": "m", "graph": "G", "framework": "bingo",
             "runtime_s": 1.0},
            {"app": "a", "mode": "m", "graph": "G", "framework": "knightking",
             "runtime_s": 3.0},
        ]
        sp = speedups(rows)
        assert sp["knightking"]["a/m"] == pytest.approx(3.0)

    def test_grid_runner(self):
        res = run_table3(graphs=["AM"], apps=["deepwalk"], modes=["mixed"],
                         frameworks=["bingo", "flowwalker"],
                         rounds=1, batch_size=40, walkers=16, length=4, seed=9)
        assert len(res["rows"]) == 2
        assert "flowwalker" in res["speedups"]


class TestTable4Driver:
    def test_matrix_shape(self):
        res = run_table4(graph="AM", rounds=2, batch_size=60, seed=10)
        assert set(res["matrix"]) == set(KINDS)
        for f in KINDS:
            assert set(res["matrix"][f]) == set(KINDS) - {f}
            for v in res["matrix"][f].values():
                assert 0.0 <= v <= 100.0

    def test_paper_reference_present(self):
        res = run_table4(graph="AM", rounds=1, batch_size=40, seed=11)
        assert res["paper"]["dense"]["one_element"] == "0.47"

    def test_census_nonempty(self):
        res = run_table4(graph="AM", rounds=1, batch_size=40, seed=12)
        assert sum(res["group_census"].values()) > 0
