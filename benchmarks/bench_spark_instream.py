"""Supplementary: Figure 1 inside Spark executors.

End-to-end DataFrame pipeline at SF~0.1 scale (600k rows): range
partition + sort + per-partition ``_ovc`` scan encode, then in-stream
aggregation whose boundary detection is either the OVC integer test
(``instream_aggregate``) or a full multi-column compare in the same
mapInPandas harness. Also the native Spark hash aggregation for
context.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql.types import LongType, StructField, StructType

from repro.core.ovc import OvcSpec
from repro.sparkops.aggregate import instream_aggregate
from repro.sparkops.ovc_column import OVC_COL, attach_ovc
from repro.synth_data import webkeys

N = 600_000
KEYS = ["k0", "k1", "k2", "k3"]


@pytest.fixture(scope="module")
def coded_df(spark):
    df = webkeys(spark, n=N, key_cols=4, ratio=100.0, seed=7)
    coded = attach_ovc(df, KEYS, num_partitions=8).cache()
    coded.count()  # materialize: benchmarks measure the consumer only
    return coded


def _full_compare_aggregate(df):
    """Same mapInPandas harness, boundaries by full column compares."""
    fields = [StructField(c, LongType()) for c in KEYS]
    fields.append(StructField("cnt", LongType()))
    schema = StructType(fields)

    def run(batches):
        parts = list(batches)
        if not parts:
            return
        pdf = pd.concat(parts, ignore_index=True)
        if not len(pdf):
            return
        g = pdf[KEYS].to_numpy(dtype=np.int64)
        bounds = np.empty(len(g), dtype=bool)
        bounds[0] = True
        np.any(g[1:] != g[:-1], axis=1, out=bounds[1:])
        gid = np.cumsum(bounds) - 1
        out = pdf.loc[bounds, KEYS].reset_index(drop=True)
        out["cnt"] = np.bincount(gid)
        yield out

    return df.mapInPandas(run, schema)


def test_spark_instream_ovc(benchmark, coded_df):
    def run():
        return instream_aggregate(
            coded_df, KEYS, 4, {"cnt": ("*", "count")}
        ).count()

    n = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=2)
    assert n == pytest.approx(N / 100, rel=0.05)


def test_spark_instream_full_compare(benchmark, coded_df):
    def run():
        return _full_compare_aggregate(coded_df).count()

    n = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=2)
    assert n == pytest.approx(N / 100, rel=0.05)


def test_spark_native_hash_aggregate(benchmark, coded_df):
    base = coded_df.drop(OVC_COL)

    def run():
        return base.groupBy(*KEYS).count().count()

    n = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=2)
    assert n == pytest.approx(N / 100, rel=0.05)


# -- executor-kernel benchmarks -----------------------------------------
# The end-to-end pipelines above are Arrow-transfer-bound at this scale
# (~0.6 s floor moving 600k x 6 columns into Python workers), which
# drowns the boundary-detection difference. These two benches measure
# the per-partition executor kernel itself on one materialized
# partition's data — the quantity Figure 1 actually varies.

@pytest.fixture(scope="module")
def partition_pdf(coded_df):
    return coded_df.toPandas()


def test_executor_kernel_ovc(benchmark, partition_pdf):
    from repro.core.ovc import OvcSpec, boundary_mask

    spec = OvcSpec(4)

    def kernel():
        codes = partition_pdf[OVC_COL].to_numpy(dtype=np.int64)
        bounds = boundary_mask(codes, spec, 4)
        bounds[0] = True
        starts = np.flatnonzero(bounds)
        out = partition_pdf.loc[bounds, KEYS].reset_index(drop=True)
        out["cnt"] = np.diff(np.append(starts, len(partition_pdf)))
        return out

    out = benchmark(kernel)
    assert out["cnt"].sum() == N


def test_executor_kernel_full_compare(benchmark, partition_pdf):
    def kernel():
        g = partition_pdf[KEYS].to_numpy(dtype=np.int64)
        bounds = np.empty(len(g), dtype=bool)
        bounds[0] = True
        np.any(g[1:] != g[:-1], axis=1, out=bounds[1:])
        gid = np.cumsum(bounds) - 1
        out = partition_pdf.loc[bounds, KEYS].reset_index(drop=True)
        out["cnt"] = np.bincount(gid)
        return out

    out = benchmark(kernel)
    assert out["cnt"].sum() == N
