"""Section 4.8: order-preserving nested-loops (lookup) join.

The outer input is sorted on its key with OVCs; ``lookup(key, payload)``
returns the matching inner rows as a stream sorted on the inner sort
key with OVCs (think: an index lookup returning a sorted coded list).
Output keys are ``outer_key ++ inner_key`` (arity KO + KI), and output
codes cost nothing: the first match of an outer row carries the outer
row's code (offsets < KO keep offset and value under the wider arity),
later matches carry the inner row's code with the offset incremented by
KO — numerically identical to the inner code under the output arity.

Within a group of duplicate outer keys the roles of the loops are
reversed (each inner row joins all buffered outer rows before the next
inner row) so that output order and maximal offsets are preserved.

Semi and anti joins output the outer key only (arity KO) and follow the
merge-join/filter rule: codes of suppressed groups are max-combined
into the next emitted row.
"""
from __future__ import annotations

from typing import Callable, Iterable, Iterator

from repro.core.ovc import OvcSpec
from repro.core.stats import CompareStats

_JOIN_TYPES = ("inner", "left_outer", "left_semi", "left_anti")


def lookup_join(
    outer: Iterable,
    lookup: Callable,
    spec_outer: OvcSpec,
    inner_arity: int,
    join_type: str = "inner",
    stats: CompareStats | None = None,
) -> Iterator[tuple]:
    """Order-preserving lookup join.

    ``join_type``: "inner", "left_outer", "left_semi", or "left_anti".
    Inner/outer yield ``(outer_key ++ inner_key, code, (outer_payload,
    inner_payload))`` (inner side zero-padded / None for outer
    non-matches); semi/anti yield ``(outer_key, code, outer_payload)``.
    """
    if spec_outer.descending:
        raise NotImplementedError("lookup join implements ascending codes")
    if join_type not in _JOIN_TYPES:
        raise ValueError(f"unknown join_type {join_type!r}")
    spec_out = OvcSpec(spec_outer.arity + inner_arity, spec_outer.base)
    semi_like = join_type in ("left_semi", "left_anti")
    out_spec = spec_outer if semi_like else spec_out
    pending: int | None = None

    def widen(outer_code: int) -> int:
        """Outer-arity code re-based to the output arity. Duplicate
        outer codes never reach here (duplicates are buffered)."""
        if semi_like:
            return outer_code
        off = spec_outer.offset_of(outer_code)
        return spec_out.code(off, spec_outer.value_of(outer_code))

    def fold(outer_code: int) -> None:
        nonlocal pending
        c = widen(outer_code)
        pending = c if pending is None else out_spec.combine(c, pending)

    def first_code_combined(outer_code: int) -> int:
        nonlocal pending
        c = widen(outer_code)
        if pending is not None:
            c = out_spec.combine(c, pending)
            pending = None
        return c

    def emit_group(group: list) -> Iterator[tuple]:
        okey, g_code = group[0][0], group[0][1]
        if stats is not None:
            stats.rows_in += len(group)
        inners = list(lookup(okey, group[0][2]))
        matched = bool(inners)
        if semi_like:
            keep = matched if join_type == "left_semi" else not matched
            if not keep:
                fold(g_code)
                return
            yield okey, first_code_combined(g_code), group[0][2]
            for _, _, p in group[1:]:
                yield okey, out_spec.duplicate_code, p
            return
        if not matched:
            if join_type == "inner":
                fold(g_code)
                return
            pad = (0,) * inner_arity
            yield okey + pad, first_code_combined(g_code), (group[0][2], None)
            for _, _, p in group[1:]:
                yield okey + pad, out_spec.duplicate_code, (p, None)
            return
        # inner / left_outer with matches: inner loop outermost within a
        # duplicate-outer group ("roles reversed", Section 4.8).
        first_out = True
        for ikey, icode, ipayload in inners:
            for gi, (_, _, opayload) in enumerate(group):
                if first_out:
                    code = first_code_combined(g_code)
                    first_out = False
                elif gi == 0:
                    # inner code's offset shifts by KO; numerically the
                    # code is unchanged under the output arity.
                    code = icode
                else:
                    code = out_spec.duplicate_code
                if stats is not None:
                    stats.rows_out += 1
                yield okey + tuple(ikey), code, (opayload, ipayload)

    group: list = []
    for okey, ocode, opayload in outer:
        if group and spec_outer.is_duplicate(ocode):
            group.append((okey, ocode, opayload))
            continue
        if group:
            yield from emit_group(group)
        group = [(okey, ocode, opayload)]
    if group:
        yield from emit_group(group)
