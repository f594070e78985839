"""Shared test helpers: coded-stream construction and the central
correctness check — an operator's output codes must equal the
brute-force predecessor encoding of its output keys (Section 4.11)."""
import numpy as np

from repro.core.ovc import OvcSpec


def bruteforce_codes(keys, spec: OvcSpec):
    return [
        spec.encode_rel(None if i == 0 else keys[i - 1], keys[i])
        for i in range(len(keys))
    ]


def coded(keys, spec: OvcSpec, payloads=None):
    """Sorted key tuples -> coded stream [(key, code, payload)]."""
    keys = [tuple(k) for k in keys]
    assert keys == sorted(keys), "coded() needs sorted input"
    codes = bruteforce_codes(keys, spec)
    if payloads is None:
        payloads = [None] * len(keys)
    return list(zip(keys, codes, payloads))


def assert_valid_coded_stream(out, spec: OvcSpec):
    """Assert keys sorted and every code equals brute-force encoding."""
    keys = [k for k, _, _ in out]
    assert keys == sorted(keys), "output not sorted"
    assert [c for _, c, _ in out] == bruteforce_codes(keys, spec), \
        "output codes disagree with brute-force predecessor encoding"


def random_sorted_keys(rng, n, arity, dom):
    keys = rng.integers(0, dom, size=(n, arity))
    keys = keys[np.lexsort(keys.T[::-1])]
    return [tuple(int(x) for x in row) for row in keys]
