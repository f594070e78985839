"""Supplementary: ordered columnar scans originate OVCs for free
(Section 4.10): deriving codes from RLE run boundaries vs re-encoding
from decoded values vs re-sorting from scratch."""
import numpy as np
import pytest

from repro.core.ovc import OvcSpec, encode_sorted_array
from repro.storage.columnar import write_columnar_run

N = 1_000_000
ARITY = 4


@pytest.fixture(scope="module")
def run_file(rng, tmp_path_factory):
    keys = rng.integers(0, 10, size=(N, ARITY))
    keys = keys[np.lexsort(keys.T[::-1])]
    spec = OvcSpec(ARITY)
    run = write_columnar_run(
        str(tmp_path_factory.mktemp("scan") / "big.run"), keys, spec,
        assume_sorted=True,
    )
    return run, keys, spec


def test_scan_with_free_ovc(benchmark, run_file):
    run, keys, spec = run_file
    keys2, codes, _ = benchmark(run.scan_with_ovc)
    assert (codes == encode_sorted_array(keys, spec)).all()


def test_scan_then_reencode(benchmark, run_file):
    run, keys, spec = run_file

    def fn():
        k, _ = run.read_columns()
        return encode_sorted_array(k, spec)

    codes = benchmark(fn)
    assert len(codes) == N


def test_scan_then_resort(benchmark, run_file):
    run, keys, spec = run_file

    def fn():
        k, _ = run.read_columns()
        order = np.lexsort(k.T[::-1])
        return encode_sorted_array(k[order], spec)

    codes = benchmark(fn)
    assert len(codes) == N
