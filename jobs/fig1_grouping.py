"""Regenerate the Figure 1 experiment: in-stream aggregation boundary
detection by OVC vs full key comparisons, 1,000,000 rows, ratio sweep.

Usage: python jobs/fig1_grouping.py [n_rows]
Prints one row per (ratio, method): wall time, output rows, column
comparisons — the rows behind Figure 1, plus the speedup per ratio.
"""
import sys

import numpy as np

from repro.core.ovc import OvcSpec
from repro.sparkops.plans import fig1_instream_aggregation
from repro.synth_data import webkeys_pandas

RATIOS = [1, 10, 100, 1000]
KEY_COLS = 4


def run(n_rows: int = 1_000_000) -> list[dict]:
    rows = []
    for ratio in RATIOS:
        pdf = webkeys_pandas(n=n_rows, key_cols=KEY_COLS,
                             ratio=float(ratio), seed=ratio)
        keys = pdf[[f"k{i}" for i in range(KEY_COLS)]].to_numpy(np.int64)
        keys = keys[np.lexsort(keys.T[::-1])]
        res = fig1_instream_aggregation(keys, KEY_COLS)
        for name, r in res.items():
            rows.append(dict(ratio=ratio, method=name,
                             ms=r.seconds * 1000, n_out=r.n_out,
                             col_cmps=r.stats.col_cmps))
    return rows


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 1_000_000
    rows = run(n)
    print(f"Figure 1 experiment: n={n}, key_cols={KEY_COLS} "
          f"(spec arity {OvcSpec(KEY_COLS).arity})")
    print(f"{'ratio':>6} {'method':>16} {'ms':>10} {'groups':>9} "
          f"{'col_cmps':>12}")
    for r in rows:
        print(f"{r['ratio']:>6} {r['method']:>16} {r['ms']:>10.2f} "
              f"{r['n_out']:>9} {r['col_cmps']:>12}")
    print("\nspeedup (full / ovc):")
    for ratio in RATIOS:
        by = {r["method"]: r for r in rows if r["ratio"] == ratio}
        print(f"  ratio {ratio:>5}: vectorized "
              f"{by['full_vectorized']['ms'] / by['ovc_vectorized']['ms']:.2f}x"
              f"  rowwise "
              f"{by['full_rowwise']['ms'] / by['ovc_rowwise']['ms']:.2f}x")


if __name__ == "__main__":
    main()
