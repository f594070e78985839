"""Regenerate the Figure 3 experiment: "intersect distinct" with
sort-based vs hash-based plans under a 10:1 input:memory ratio.

Usage: python jobs/fig3_intersect.py [n_rows_per_input]
Prints one row per plan/substrate: wall time, spilled rows, output.
"""
import sys
import tempfile

import numpy as np

from repro.sparkops.plans import (
    hash_intersect_plan,
    hash_intersect_plan_vec,
    sort_intersect_plan,
    sort_intersect_plan_vec,
)


def run(n: int, mem_ratio: int = 10) -> list[dict]:
    rng = np.random.default_rng(2023)
    t1 = rng.integers(0, 2 * n, n)
    t2 = rng.integers(0, 2 * n, n)
    mem = n // mem_ratio
    out = []
    with tempfile.TemporaryDirectory() as d:
        for name, fn in [("sort_vec", sort_intersect_plan_vec),
                         ("hash_vec", hash_intersect_plan_vec)]:
            r = fn(t1, t2, mem, f"{d}/{name}")
            out.append(dict(plan=name, seconds=r.seconds,
                            spilled=r.stats.rows_spilled, n_out=r.n_out))
        n_row = n // 10  # row-wise substrate at reduced scale
        r1, r2 = t1[:n_row], t2[:n_row]
        for name, fn in [("sort_rowwise", sort_intersect_plan),
                         ("hash_rowwise", hash_intersect_plan)]:
            r = fn(r1, r2, n_row // mem_ratio, f"{d}/{name}")
            out.append(dict(plan=name, seconds=r.seconds,
                            spilled=r.stats.rows_spilled, n_out=r.n_out))
    return out


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 2_000_000
    rows = run(n)
    print(f"Figure 3 experiment: n={n} rows/input (rowwise at n/10), "
          "memory = n/10 rows per blocking operator")
    print(f"{'plan':>14} {'seconds':>9} {'rows_spilled':>13} {'n_out':>9}")
    for r in rows:
        print(f"{r['plan']:>14} {r['seconds']:>9.3f} "
              f"{r['spilled']:>13} {r['n_out']:>9}")


if __name__ == "__main__":
    main()
