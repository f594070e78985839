"""Machine-independent effort counters.

The paper's performance claims are about *comparison structure* (column
value comparisons bounded by N x K, spill passes halved), not about a
particular CPU. Every row-at-a-time algorithm in this repo threads a
``CompareStats`` through, so benchmarks can report counters next to
wall-clock time.
"""
from __future__ import annotations

from dataclasses import dataclass, fields


@dataclass
class CompareStats:
    """Counters for one operator/plan execution.

    Attributes:
        row_cmps: row-to-row comparisons performed (each may be decided
            by codes alone or require column comparisons).
        code_decided: row comparisons decided purely by an integer
            offset-value-code comparison (the paper's "single machine
            instruction" case).
        col_cmps: individual column-value comparisons (the quantity the
            paper bounds by N x K).
        col_accesses: column values read (hash plans pay N x K here for
            the hash function alone).
        hash_ops: hash computations over key columns.
        rows_spilled: rows written to temporary storage (Figure 3's
            "each input row is spilled twice/once").
        rows_in / rows_out: stream cardinalities.
    """

    row_cmps: int = 0
    code_decided: int = 0
    col_cmps: int = 0
    col_accesses: int = 0
    hash_ops: int = 0
    rows_spilled: int = 0
    rows_in: int = 0
    rows_out: int = 0

    def merged(self, other: "CompareStats") -> "CompareStats":
        """Return a new CompareStats with both sets of counters summed."""
        out = CompareStats()
        for f in _FIELDS:
            setattr(out, f, getattr(self, f) + getattr(other, f))
        return out

    def as_dict(self) -> dict:
        return {f: getattr(self, f) for f in _FIELDS}


_FIELDS = [f.name for f in fields(CompareStats)]
