"""Figure 1: group boundaries from offset-value codes.

In-stream aggregation ("select ..., count(*) ... group by ...") over a
pre-sorted stream of 1,000,000 rows with 4 key columns; the ratio of
input rows to output rows varies over {1, 10, 100, 1000}. Compared:
boundary detection by one integer OVC offset test vs full comparisons
of the key columns — vectorized (compiled analogue, the wall-clock
numbers quoted in EXPERIMENTS.md) and row-at-a-time (comparison-count
substrate).
"""
import numpy as np
import pytest

from benchmarks.conftest import FIG1_ROWS
from repro.core.ovc import OvcSpec, boundary_mask, encode_sorted_array
from repro.synth_data import webkeys_pandas

KEY_COLS = 4
RATIOS = [1, 10, 100, 1000]


@pytest.fixture(scope="module")
def sorted_inputs():
    data = {}
    for ratio in RATIOS:
        pdf = webkeys_pandas(n=FIG1_ROWS, key_cols=KEY_COLS,
                             ratio=float(ratio), seed=ratio)
        keys = pdf[[f"k{i}" for i in range(KEY_COLS)]].to_numpy(np.int64)
        keys = keys[np.lexsort(keys.T[::-1])]
        spec = OvcSpec(KEY_COLS)
        data[ratio] = (keys, encode_sorted_array(keys, spec), spec)
    return data


def _agg_ovc(keys, codes, spec):
    bounds = boundary_mask(codes, spec, KEY_COLS)
    bounds[0] = True
    return np.bincount(np.cumsum(bounds) - 1)


def _agg_full(keys, codes, spec):
    n = len(keys)
    bounds = np.empty(n, dtype=bool)
    bounds[0] = True
    np.any(keys[1:] != keys[:-1], axis=1, out=bounds[1:])
    return np.bincount(np.cumsum(bounds) - 1)


@pytest.mark.parametrize("ratio", RATIOS)
@pytest.mark.parametrize("method", ["ovc", "full"])
def test_fig1_boundary_detection(benchmark, sorted_inputs, ratio, method):
    keys, codes, spec = sorted_inputs[ratio]
    fn = _agg_ovc if method == "ovc" else _agg_full
    counts = benchmark(fn, keys, codes, spec)
    assert counts.sum() == FIG1_ROWS
    expect_groups = round(FIG1_ROWS / ratio)
    assert abs(len(counts) - expect_groups) <= max(2, 0.01 * expect_groups)
