"""LSM-forest demo job: ingest batches, scan through the ``ovc`` Spark
DataSource, run an in-stream aggregation over the free scan codes.

Usage: spark-submit jobs/lsm_scan.py [n_rows_per_batch] [n_batches]
"""
import sys
import tempfile

import numpy as np

from repro.core.ovc import OvcSpec
from repro.storage.datasource import OvcDataSource
from repro.storage.lsm import LsmForest


def run(spark, root: str, n: int = 100_000, batches: int = 4):
    rng = np.random.default_rng(0)
    forest = LsmForest(root, OvcSpec(3))
    for _ in range(batches):
        forest.ingest(rng.integers(0, 8, size=(n, 3)),
                      rng.integers(0, 100, n))
    spark.dataSource.register(OvcDataSource)
    df = spark.read.format("ovc").option("path", root).load()
    df.createOrReplaceTempView("forest")
    return spark.sql(
        "select count(*) as rows, sum(cast(_ovc = 0 as long)) as dup_rows, "
        "count(distinct k0, k1, k2) as distinct_keys from forest"
    )


def main() -> None:
    from _session import get_session

    n = int(sys.argv[1]) if len(sys.argv) > 1 else 100_000
    b = int(sys.argv[2]) if len(sys.argv) > 2 else 4
    spark = get_session("lsm_scan")
    with tempfile.TemporaryDirectory() as d:
        run(spark, f"{d}/forest", n, b).show()
    spark.stop()


if __name__ == "__main__":
    main()
