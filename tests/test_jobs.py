"""Tests for the jobs/ entrypoints (driven as functions)."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))

import fig1_grouping  # noqa: E402
import fig3_intersect  # noqa: E402
import lsm_scan  # noqa: E402
import table1_ovc  # noqa: E402


class TestTable1Job:
    def test_table1_matches_paper(self):
        rows = table1_ovc.table1()
        desc = [d for _, d, _ in rows]
        asc = [a for _, _, a in rows]
        assert [c for *_, c in desc] == [95, 388, 192, 191, 400, 297, 393]
        assert [c for *_, c in asc] == [405, 112, 308, 309, 0, 203, 107]

    def test_table2_matches_paper(self):
        assert [(k, c) for k, _, _, c in table1_ovc.table2()] == [
            ((5, 7, 3, 9), 405), ((5, 9, 3, 7), 309)
        ]

    def test_main_prints(self, capsys):
        table1_ovc.main()
        out = capsys.readouterr().out
        assert "405" in out and "Table 2" in out


class TestFig1Job:
    def test_run_small(self):
        rows = fig1_grouping.run(20_000)
        assert len(rows) == 4 * 4  # 4 ratios x 4 methods
        for ratio in (1, 10, 100, 1000):
            outs = {r["n_out"] for r in rows if r["ratio"] == ratio}
            assert len(outs) == 1
        ovc = [r for r in rows if r["method"].startswith("ovc")]
        assert all(r["col_cmps"] == 0 for r in ovc)


class TestFig3Job:
    def test_run_small(self):
        rows = fig3_intersect.run(20_000)
        by = {r["plan"]: r for r in rows}
        assert by["sort_vec"]["n_out"] == by["hash_vec"]["n_out"]
        assert by["sort_rowwise"]["n_out"] == by["hash_rowwise"]["n_out"]
        # the central Figure 3 invariant: hash spills ~2x the sort plan
        assert by["hash_vec"]["spilled"] > 1.5 * by["sort_vec"]["spilled"]
        assert by["hash_rowwise"]["spilled"] > \
            1.5 * by["sort_rowwise"]["spilled"]


class TestLsmScanJob:
    def test_run(self, spark, tmp_path):
        df = lsm_scan.run(spark, str(tmp_path / "forest"), n=5_000, batches=3)
        row = df.collect()[0]
        assert row["rows"] == 15_000
        # 8^3 = 512 possible keys, 15000 draws: all present w.h.p.
        assert row["distinct_keys"] == 512
        assert row["dup_rows"] > 0
