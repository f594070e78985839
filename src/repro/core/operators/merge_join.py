"""Section 4.7: merge join (inner, semi, anti, left outer) and set
operations (intersect, difference) over sorted, OVC-coded streams.

Both inputs are sorted on the join key (the streams' key IS the join
key; non-key columns ride in the payload). The merge logic is a 2-way
tree-of-losers merge of the two inputs, which (a) needs no column
comparisons beyond those of a merge step in an external sort, and
(b) directly exposes key-equality through the duplicate code: in the
merged tagged stream, rows of one equal-key group are exactly a row
followed by rows with the duplicate code.

Output OVC rules (all integer arithmetic):
- left rows that produce output keep their code, max-combined with the
  codes of all merged rows consumed since the previous output (the
  filter rule generalized to semi joins — "the minimum offset among an
  output row and the recent rows that failed the predicate");
- secondary outputs of a multi-match (duplicate join keys) carry the
  duplicate code.
"""
from __future__ import annotations

from enum import Enum
from typing import Iterable, Iterator

from repro.core.ovc import OvcSpec
from repro.core.stats import CompareStats
from repro.core.tree_of_losers import OvcLoserTree


class JoinType(Enum):
    INNER = "inner"
    LEFT_SEMI = "left_semi"
    LEFT_ANTI = "left_anti"
    LEFT_OUTER = "left_outer"


_L, _R = 0, 1


def _tagged(stream: Iterable, tag: int) -> Iterator[tuple]:
    for key, code, payload in stream:
        yield key, code, (tag, payload)


def _equal_key_groups(
    left: Iterable, right: Iterable, spec: OvcSpec,
    stats: CompareStats | None,
) -> Iterator[tuple]:
    """Merge the two inputs and yield one tuple per distinct key:
    ``(key, group_code, left_payloads, right_payloads)`` where
    ``group_code`` is the first merged row's code of the group."""
    merged = OvcLoserTree(
        [_tagged(left, _L), _tagged(right, _R)], spec, stats
    )
    key = code = None
    lp: list = []
    rp: list = []
    for k, c, (tag, payload) in merged:
        if key is not None and spec.is_duplicate(c):
            (lp if tag == _L else rp).append(payload)
            continue
        if key is not None:
            yield key, code, lp, rp
        key, code, lp, rp = k, c, [], []
        (lp if tag == _L else rp).append(payload)
    if key is not None:
        yield key, code, lp, rp


def merge_join(
    left: Iterable,
    right: Iterable,
    spec: OvcSpec,
    join_type: JoinType = JoinType.INNER,
    stats: CompareStats | None = None,
) -> Iterator[tuple]:
    """Join two sorted coded streams on their (full) key.

    Yields ``(key, code, payload)``; for INNER/LEFT_OUTER the payload is
    ``(left_payload, right_payload)`` (right None for outer non-match),
    for semi/anti joins it is the left payload. Output codes follow the
    Section 4.7 rules; codes are relative to predecessors in the output.
    """
    pending: int | None = None

    def out_code(first_code: int) -> int:
        nonlocal pending
        c = first_code if pending is None else spec.combine(first_code, pending)
        pending = None
        return c

    def fold(code: int) -> None:
        nonlocal pending
        pending = code if pending is None else spec.combine(code, pending)

    for key, code, lp, rp in _equal_key_groups(left, right, spec, stats):
        matched = bool(lp) and bool(rp)
        if join_type is JoinType.LEFT_SEMI:
            emit = list(lp) if matched else []
        elif join_type is JoinType.LEFT_ANTI:
            emit = list(lp) if not matched else []
        elif join_type is JoinType.INNER:
            emit = [(pl, pr) for pr in rp for pl in lp] if matched else []
        else:  # LEFT_OUTER
            if matched:
                emit = [(pl, pr) for pr in rp for pl in lp]
            else:
                emit = [(pl, None) for pl in lp]
        if not emit:
            fold(code)
            continue
        if stats is not None:
            stats.rows_out += len(emit)
        yield key, out_code(code), emit[0]
        for payload in emit[1:]:
            yield key, spec.duplicate_code, payload


def intersect_distinct(
    left: Iterable,
    right: Iterable,
    spec: OvcSpec,
    stats: CompareStats | None = None,
) -> Iterator[tuple]:
    """SQL INTERSECT over duplicate-free sorted inputs = left semi join
    (Section 4.7: "intersection proceeds mostly like an inner join")."""
    return merge_join(left, right, spec, JoinType.LEFT_SEMI, stats)


def difference_distinct(
    left: Iterable,
    right: Iterable,
    spec: OvcSpec,
    stats: CompareStats | None = None,
) -> Iterator[tuple]:
    """SQL EXCEPT over duplicate-free sorted inputs = left anti join."""
    return merge_join(left, right, spec, JoinType.LEFT_ANTI, stats)
