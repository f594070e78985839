"""Tests for the vectorized (compiled-substrate) Figure 3 plans and
the CompareStats utilities."""
import numpy as np
import pytest

from repro.core.stats import CompareStats
from repro.sparkops.plans import (
    _dedup_mask,
    hash_intersect_plan_vec,
    sort_intersect_plan_vec,
)


class TestDedupMask:
    def test_basic(self):
        arr = np.array([1, 1, 2, 3, 3, 3])
        assert _dedup_mask(arr).tolist() == [True, False, True, True,
                                             False, False]

    def test_empty(self):
        assert _dedup_mask(np.array([], dtype=np.int64)).tolist() == []


class TestVecPlans:
    def _inputs(self, n, seed):
        rng = np.random.default_rng(seed)
        return rng.integers(0, 2 * n, n), rng.integers(0, 2 * n, n)

    @pytest.mark.parametrize("n,mem", [(1000, 5000), (20_000, 2000)])
    def test_agree_with_numpy_intersection(self, tmp_path, n, mem):
        t1, t2 = self._inputs(n, 1)
        expect = len(np.intersect1d(t1, t2))
        rs = sort_intersect_plan_vec(t1, t2, mem, str(tmp_path / "s"))
        rh = hash_intersect_plan_vec(t1, t2, mem, str(tmp_path / "h"))
        assert rs.n_out == rh.n_out == expect

    def test_no_spill_when_in_memory(self, tmp_path):
        t1, t2 = self._inputs(1000, 2)
        rs = sort_intersect_plan_vec(t1, t2, 10_000, str(tmp_path / "s"))
        rh = hash_intersect_plan_vec(t1, t2, 10_000, str(tmp_path / "h"))
        assert rs.stats.rows_spilled == rh.stats.rows_spilled == 0

    def test_external_spill_shape(self, tmp_path):
        # hash spills each input row once in dedup + survivors in join;
        # sort spills each row at most once.
        n, mem = 20_000, 2000
        t1, t2 = self._inputs(n, 3)
        rs = sort_intersect_plan_vec(t1, t2, mem, str(tmp_path / "s"))
        rh = hash_intersect_plan_vec(t1, t2, mem, str(tmp_path / "h"))
        assert rs.stats.rows_spilled <= 2 * n
        assert rh.stats.rows_spilled > 1.5 * rs.stats.rows_spilled

    def test_agrees_with_rowwise_plans(self, tmp_path):
        from repro.sparkops.plans import hash_intersect_plan, sort_intersect_plan

        n, mem = 5000, 500
        t1, t2 = self._inputs(n, 4)
        outs = {
            sort_intersect_plan_vec(t1, t2, mem, str(tmp_path / "a")).n_out,
            hash_intersect_plan_vec(t1, t2, mem, str(tmp_path / "b")).n_out,
            sort_intersect_plan(t1, t2, mem, str(tmp_path / "c")).n_out,
            hash_intersect_plan(t1, t2, mem, str(tmp_path / "d")).n_out,
        }
        assert len(outs) == 1


class TestCompareStats:
    def test_merged_sums_all_fields(self):
        a = CompareStats(row_cmps=1, col_cmps=2, rows_spilled=3)
        b = CompareStats(row_cmps=10, hash_ops=5)
        m = a.merged(b)
        assert m.row_cmps == 11 and m.col_cmps == 2
        assert m.rows_spilled == 3 and m.hash_ops == 5
        # inputs unchanged
        assert a.row_cmps == 1 and b.row_cmps == 10

    def test_as_dict_roundtrip(self):
        s = CompareStats(code_decided=7)
        d = s.as_dict()
        assert d["code_decided"] == 7 and set(d) >= {
            "row_cmps", "col_cmps", "rows_spilled", "hash_ops"
        }
