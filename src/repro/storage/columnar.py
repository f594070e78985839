"""Sorted RLE columnar run format over the local filesystem.

A run stores K sort-key columns (int64, sorted lexicographically) with
run-length encoding per column plus an arbitrary number of int64
payload columns stored flat. For sorted data the leading columns
compress massively — and, crucially (Section 4.10), the RLE run starts
double as OVC metadata:

    the offset of row i is the smallest column index whose RLE run
    starts at i (no such column: duplicate row, offset = K), and the
    value at that offset is that run's stored value.

So a scan reproduces, row by row, the offset-value codes that the sort
which created the run had computed — "practically for free", with zero
column value comparisons. ``scan_with_ovc`` returns exactly those codes.

File layout: one Arrow IPC file holding a single record batch. Arrays
of different logical lengths (RLE arrays are much shorter than the row
count) are padded to a common width; true lengths live in the schema
metadata.
"""
from __future__ import annotations

import json
import os
from typing import Iterator

import numpy as np
import pyarrow as pa
import pyarrow.ipc as ipc

from repro.core.ovc import OvcSpec

_PAD = np.int64(-(1 << 62))  # ragged-column padding sentinel


def _rle_encode(col: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """(values, run_lengths) with runs broken on value change only."""
    n = len(col)
    if n == 0:
        return np.zeros(0, np.int64), np.zeros(0, np.int64)
    starts = np.flatnonzero(np.concatenate(([True], col[1:] != col[:-1])))
    lengths = np.diff(np.concatenate((starts, [n])))
    return col[starts].astype(np.int64), lengths.astype(np.int64)


def _rle_decode(values: np.ndarray, lengths: np.ndarray) -> np.ndarray:
    return np.repeat(values, lengths)


class ColumnarRun:
    """A sorted, RLE-compressed run on disk."""

    def __init__(self, path: str) -> None:
        self.path = path
        with pa.OSFile(path, "rb") as f:
            reader = ipc.open_file(f)
            meta = json.loads(reader.schema.metadata[b"repro"].decode())
        self.n_rows: int = meta["n_rows"]
        self.arity: int = meta["arity"]
        self.base: int = meta["base"]
        self.payload_names: list[str] = meta["payloads"]
        self._lengths: dict[str, int] = meta["lengths"]

    @property
    def spec(self) -> OvcSpec:
        return OvcSpec(self.arity, self.base)

    def _arrays(self) -> dict[str, np.ndarray]:
        """All stored arrays trimmed to their true lengths."""
        with pa.OSFile(self.path, "rb") as f:
            reader = ipc.open_file(f)
            batch = reader.get_batch(0) if reader.num_record_batches else None
        out = {}
        for name, ln in self._lengths.items():
            if batch is None:
                out[name] = np.zeros(0, np.int64)
            else:
                i = batch.schema.names.index(name)
                out[name] = batch.column(i).to_numpy(zero_copy_only=False)[:ln]
        return out

    def read_columns(self) -> tuple[np.ndarray, dict[str, np.ndarray]]:
        """Decode to (keys (n, K) int64, payload-column dict)."""
        arrays = self._arrays()
        if self.n_rows == 0:
            keys = np.zeros((0, self.arity), np.int64)
        else:
            keys = np.column_stack(
                [_rle_decode(arrays[f"v{i}"], arrays[f"l{i}"])
                 for i in range(self.arity)]
            )
        return keys, {m: arrays[m] for m in self.payload_names}

    def scan_with_ovc(self) -> tuple[np.ndarray, np.ndarray, dict]:
        """Return (keys, codes, payloads). Codes are derived from RLE
        run starts only — no value comparisons (see module docstring)."""
        arrays = self._arrays()
        n, k, base = self.n_rows, self.arity, self.base
        if n == 0:
            return (np.zeros((0, k), np.int64), np.zeros(0, np.int64),
                    {m: arrays[m] for m in self.payload_names})
        offsets = np.full(n, k, dtype=np.int64)
        values = np.zeros(n, dtype=np.int64)
        key_cols = []
        # Walk columns from last to first so the smallest column index
        # with a run start wins (it overwrites later columns' marks).
        for c in range(k - 1, -1, -1):
            v, l = arrays[f"v{c}"], arrays[f"l{c}"]
            starts = np.concatenate(([0], np.cumsum(l)[:-1])) if len(l) else \
                np.zeros(0, np.int64)
            offsets[starts] = c
            values[starts] = v
            key_cols.append(_rle_decode(v, l))
        keys = np.column_stack(key_cols[::-1])
        codes = np.where(offsets < k, (k - offsets) * base + values, 0)
        return keys, codes.astype(np.int64), \
            {m: arrays[m] for m in self.payload_names}

    def iter_rows(self) -> Iterator[tuple]:
        """Row-at-a-time coded stream ``(key, code, payload0)`` —
        adapter for the tree-of-losers merge."""
        keys, codes, payloads = self.scan_with_ovc()
        pay = (payloads[self.payload_names[0]]
               if self.payload_names else np.full(len(keys), -1))
        for i in range(len(keys)):
            p = int(pay[i])
            yield tuple(int(x) for x in keys[i]), int(codes[i]), \
                None if p == -1 else p

    def delete(self) -> None:
        if os.path.exists(self.path):
            os.remove(self.path)


def write_columnar_run(
    path: str,
    keys: np.ndarray,
    spec: OvcSpec,
    payloads: dict[str, np.ndarray] | None = None,
    assume_sorted: bool = False,
) -> ColumnarRun:
    """Write sorted keys (+ payload columns) as an RLE columnar run.

    Keys must be lexicographically sorted ascending (checked with a
    vectorized first-difference test unless ``assume_sorted``).
    """
    keys = np.asarray(keys, dtype=np.int64)
    if keys.ndim != 2:
        raise ValueError("keys must be a 2-D (n, arity) array")
    n, k = keys.shape
    if k != spec.arity:
        raise ValueError(f"key width {k} != arity {spec.arity}")
    if not assume_sorted and n > 1:
        diff = keys[1:] != keys[:-1]
        first = np.where(diff.any(1), diff.argmax(1), 0)
        rows = np.flatnonzero(diff.any(1))
        if rows.size and not (
            keys[rows, first[rows]] < keys[rows + 1, first[rows]]
        ).all():
            raise ValueError("keys are not sorted")
    payloads = payloads or {}
    reserved = {f"v{i}" for i in range(k)} | {f"l{i}" for i in range(k)}
    arrays: dict[str, np.ndarray] = {}
    for i in range(k):
        col = keys[:, i] if n else np.zeros(0, np.int64)
        arrays[f"v{i}"], arrays[f"l{i}"] = _rle_encode(col)
    for name, arr in payloads.items():
        if name in reserved:
            raise ValueError(f"payload name {name!r} is reserved")
        arr = np.asarray(arr, dtype=np.int64)
        if len(arr) != n:
            raise ValueError(f"payload {name} has wrong length")
        arrays[name] = arr
    width = max((len(a) for a in arrays.values()), default=0)
    fields, cols = [], []
    for name, arr in arrays.items():
        padded = np.full(width, _PAD, dtype=np.int64)
        padded[: len(arr)] = arr
        fields.append(pa.field(name, pa.int64()))
        cols.append(pa.array(padded))
    meta = {
        "n_rows": n, "arity": k, "base": spec.base,
        "payloads": list(payloads),
        "lengths": {name: len(arr) for name, arr in arrays.items()},
    }
    schema = pa.schema(fields, metadata={b"repro": json.dumps(meta).encode()})
    parent = os.path.dirname(path)
    if parent:
        os.makedirs(parent, exist_ok=True)
    with pa.OSFile(path, "wb") as sink:
        with ipc.new_file(sink, schema) as writer:
            if width:
                writer.write_batch(pa.record_batch(cols, schema=schema))
    return ColumnarRun(path)


def compressed_key_cells(run: ColumnarRun) -> int:
    """Total stored RLE cells across key columns (values + lengths) —
    the compression metric reported in the storage benchmarks."""
    return sum(run._lengths[f"v{i}"] + run._lengths[f"l{i}"]
               for i in range(run.arity))
