"""Figure 3: "intersect distinct" — sort-based vs hash-based plans.

Paper setup: two inputs of 100,000,000 rows, 10,000,000 rows of memory
per blocking operator; the hash plan (2 hash dedups + hash join, three
blocking operators) spills each input row twice, the sort plan (2
in-sort dedups + OVC merge join, two blocking operators) once. Scaled
here 50x down at the same 10:1 input:memory ratio (override with
FIG3_ROWS). The vectorized pair is the wall-clock comparison on
compiled primitives; the row-wise pair exercises the full tree-of-
losers/OVC machinery and reports spill/comparison counters.
"""
import numpy as np
import pytest

from benchmarks.conftest import FIG3_MEM_RATIO, FIG3_ROWS_ROWWISE, FIG3_ROWS_VEC
from repro.sparkops.plans import (
    hash_intersect_plan,
    hash_intersect_plan_vec,
    sort_intersect_plan,
    sort_intersect_plan_vec,
)


@pytest.fixture(scope="module")
def inputs_vec(rng):
    n = FIG3_ROWS_VEC
    return (rng.integers(0, 2 * n, n), rng.integers(0, 2 * n, n))


@pytest.fixture(scope="module")
def inputs_rowwise(rng):
    n = FIG3_ROWS_ROWWISE
    return (rng.integers(0, 2 * n, n), rng.integers(0, 2 * n, n))


@pytest.mark.parametrize("plan", ["sort", "hash"])
def test_fig3_vectorized(benchmark, tmp_path, inputs_vec, plan):
    t1, t2 = inputs_vec
    mem = len(t1) // FIG3_MEM_RATIO
    fn = sort_intersect_plan_vec if plan == "sort" else hash_intersect_plan_vec
    counter = iter(range(10**6))

    def run():
        return fn(t1, t2, mem, str(tmp_path / f"{plan}{next(counter)}"))

    res = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    benchmark.extra_info["rows_spilled"] = res.stats.rows_spilled
    benchmark.extra_info["n_out"] = res.n_out
    expect = len(np.intersect1d(t1, t2))
    assert res.n_out == expect


@pytest.mark.parametrize("plan", ["sort", "hash"])
def test_fig3_rowwise_counters(benchmark, tmp_path, inputs_rowwise, plan):
    t1, t2 = inputs_rowwise
    mem = len(t1) // FIG3_MEM_RATIO
    fn = sort_intersect_plan if plan == "sort" else hash_intersect_plan
    counter = iter(range(10**6))

    def run():
        return fn(t1, t2, mem, str(tmp_path / f"{plan}{next(counter)}"))

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(
        rows_spilled=res.stats.rows_spilled,
        col_cmps=res.stats.col_cmps,
        code_decided=res.stats.code_decided,
        hash_ops=res.stats.hash_ops,
        n_out=res.n_out,
    )
    assert res.n_out == len(np.intersect1d(t1, t2))
