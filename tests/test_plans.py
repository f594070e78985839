"""Tests for the driver-side Section 6 plans (Figures 1 and 3)."""
import numpy as np
import pytest

from repro.sparkops.plans import (
    fig1_instream_aggregation,
    hash_intersect_plan,
    sort_intersect_plan,
)
from repro.synth_data import webkeys_pandas


def sorted_webkeys(n, ratio, key_cols=4, seed=0):
    pdf = webkeys_pandas(n=n, key_cols=key_cols, ratio=ratio, seed=seed)
    keys = pdf[[f"k{i}" for i in range(key_cols)]].to_numpy(dtype=np.int64)
    return keys[np.lexsort(keys.T[::-1])]


class TestFig1:
    @pytest.mark.parametrize("ratio", [1.0, 10.0, 100.0])
    def test_all_variants_agree(self, ratio):
        keys = sorted_webkeys(5000, ratio)
        res = fig1_instream_aggregation(keys, group_cols=4)
        outs = {r.n_out for r in res.values()}
        assert len(outs) == 1
        expect = len(np.unique(keys, axis=0))
        assert outs == {expect}

    def test_ovc_does_no_column_comparisons(self):
        keys = sorted_webkeys(3000, 10.0)
        res = fig1_instream_aggregation(keys, group_cols=4)
        assert res["ovc_rowwise"].stats.col_cmps == 0
        assert res["full_rowwise"].stats.col_cmps >= 3000 - 1

    def test_group_prefix_smaller_than_arity(self):
        keys = sorted_webkeys(2000, 5.0)
        res = fig1_instream_aggregation(keys, group_cols=2)
        expect = len(np.unique(keys[:, :2], axis=0))
        assert res["ovc_vectorized"].n_out == expect


class TestFig3Plans:
    def _keys(self, n, seed, n_distinct):
        rng = np.random.default_rng(seed)
        return rng.integers(0, n_distinct, n)

    @pytest.mark.parametrize("n,mem", [(2000, 5000), (5000, 500)])
    def test_plans_agree_with_numpy_intersection(self, tmp_path, n, mem):
        t1 = self._keys(n, 1, n * 2)
        t2 = self._keys(n, 2, n * 2)
        expect = len(np.intersect1d(t1, t2))
        rs = sort_intersect_plan(t1, t2, mem, str(tmp_path / "s"))
        rh = hash_intersect_plan(t1, t2, mem, str(tmp_path / "h"))
        assert rs.n_out == rh.n_out == expect

    def test_spill_passes_in_memory(self, tmp_path):
        # inputs fit: neither plan spills
        t1 = self._keys(1000, 3, 5000)
        t2 = self._keys(1000, 4, 5000)
        rs = sort_intersect_plan(t1, t2, 10_000, str(tmp_path / "s"))
        rh = hash_intersect_plan(t1, t2, 10_000, str(tmp_path / "h"))
        assert rs.stats.rows_spilled == 0
        assert rh.stats.rows_spilled == 0

    def test_spill_passes_external(self, tmp_path):
        # the Figure 3 regime: inputs 10x memory. Sort plan spills each
        # input row at most once; hash plan roughly twice (dedup pass +
        # join pass over the distinct survivors).
        n, mem = 5000, 500
        t1 = self._keys(n, 5, n * 2)
        t2 = self._keys(n, 6, n * 2)
        rs = sort_intersect_plan(t1, t2, mem, str(tmp_path / "s"))
        rh = hash_intersect_plan(t1, t2, mem, str(tmp_path / "h"))
        assert rs.stats.rows_spilled <= 2 * n
        n_distinct = len(np.unique(t1)) + len(np.unique(t2))
        assert rh.stats.rows_spilled == 2 * n + n_distinct
        assert rh.stats.rows_spilled > 1.5 * rs.stats.rows_spilled

    def test_hash_plan_pays_nk_hash_accesses(self, tmp_path):
        t1 = self._keys(1000, 7, 800)
        t2 = self._keys(1000, 8, 800)
        rh = hash_intersect_plan(t1, t2, 10_000, str(tmp_path / "h"))
        assert rh.stats.col_accesses >= 2000
