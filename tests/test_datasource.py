"""Tests for the ``ovc`` PySpark Python DataSource over LSM forests."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.ovc import OvcSpec, encode_sorted_array
from repro.storage.datasource import OvcDataSource
from repro.storage.lsm import LsmForest

SPEC = OvcSpec(arity=3, base=1 << 32)


@pytest.fixture(scope="module")
def registered(spark):
    spark.dataSource.register(OvcDataSource)
    return spark


@pytest.fixture()
def forest(tmp_path):
    rng = np.random.default_rng(0)
    f = LsmForest(str(tmp_path / "forest"), SPEC)
    for i in range(3):
        f.ingest(rng.integers(0, 6, size=(200, 3)),
                 rng.integers(0, 100, 200))
    return f


class TestOvcDataSource:
    def test_schema_and_counts(self, registered, forest):
        df = registered.read.format("ovc").option("path", forest.root).load()
        assert df.columns == ["k0", "k1", "k2", "p0", "_ovc"]
        assert df.count() == 600
        assert df.rdd.getNumPartitions() == 3

    def test_partition_codes_match_scan(self, registered, forest):
        df = registered.read.format("ovc").option("path", forest.root).load()
        pdf = df.withColumn("pid", F.spark_partition_id()).toPandas()
        for _, part in pdf.groupby("pid"):
            arr = part[["k0", "k1", "k2"]].to_numpy(dtype=np.int64)
            assert (arr[np.lexsort(arr.T[::-1])] == arr).all()
            assert (encode_sorted_array(arr, SPEC) ==
                    part["_ovc"].to_numpy()).all()

    def test_sql_over_datasource(self, registered, forest):
        df = registered.read.format("ovc").option("path", forest.root).load()
        df.createOrReplaceTempView("forest")
        got = registered.sql(
            "select count(*) as dup_rows from forest where _ovc = 0"
        ).collect()[0]["dup_rows"]
        # rows with code 0 are exactly within-partition duplicates
        pdf = df.toPandas()
        assert got == (pdf["_ovc"] == 0).sum()
        assert got > 0  # domain 6^3 over 200 rows: duplicates certain

    def test_single_run_file_path(self, registered, forest):
        run = forest.runs[0]
        df = registered.read.format("ovc").option("path", run.path).load()
        assert df.count() == 200

    def test_compacted_forest_single_partition(self, registered, forest):
        forest.compact()
        df = registered.read.format("ovc").option("path", forest.root).load()
        assert df.rdd.getNumPartitions() == 1
        assert df.count() == 600
        # after compaction the whole table is one sorted coded stream
        pdf = df.toPandas()
        arr = pdf[["k0", "k1", "k2"]].to_numpy(dtype=np.int64)
        assert (encode_sorted_array(arr, SPEC) ==
                pdf["_ovc"].to_numpy()).all()

    def test_missing_path_option(self, registered, tmp_path):
        with pytest.raises(Exception):
            registered.read.format("ovc").load().collect()
