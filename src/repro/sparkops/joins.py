"""Order-preserving merge joins and set operations in Spark.

PySpark exposes no zipPartitions for DataFrames, so the two sorted
inputs are combined with the standard trick for co-partitioned merges:
tag each side, union, range-partition by the join key (equal keys land
in one partition) and sort within partitions by (key, tag). Each
partition then holds both sides' rows of a key range in merge order,
and a single ``mapInPandas`` runs the core Section 4.7 merge-join logic
(`repro.core.operators.merge_join`) over them, consuming per-partition
``_ovc`` codes and producing ``_ovc`` codes for the join output.

Non-key columns are carried as payloads; output column layout:
left non-key columns, right non-key columns (inner/outer only), key
columns, ``_ovc``.
"""
from __future__ import annotations

from typing import Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import LongType, StructField, StructType

from repro.core.operators.merge_join import JoinType, merge_join
from repro.core.ovc import DEFAULT_BASE, OvcSpec, encode_sorted_array
from repro.sparkops.ovc_column import OVC_COL

_TAG = "_side"


def merge_join_ovc(
    left: DataFrame,
    right: DataFrame,
    on: Sequence[str],
    how: str = "inner",
    base: int = DEFAULT_BASE,
    num_partitions: int | None = None,
) -> DataFrame:
    """Merge join of two inputs on integral key columns ``on``.

    ``how``: inner, left_semi, left_anti, left_outer. Inputs need not
    be pre-sorted or carry ``_ovc``: the tagged union is range-
    partitioned and sorted here (the "interesting ordering" a real
    planner would have arranged), and per-partition codes are derived
    during the scan of the sorted union, then consumed by the merge.
    """
    on = list(on)
    jt = {
        "inner": JoinType.INNER,
        "left_semi": JoinType.LEFT_SEMI,
        "left_anti": JoinType.LEFT_ANTI,
        "left_outer": JoinType.LEFT_OUTER,
    }[how]
    spec = OvcSpec(len(on), base)
    lcols = [c for c in left.columns if c not in on and c != OVC_COL]
    rcols = [c for c in right.columns if c not in on and c != OVC_COL]
    overlap = set(lcols) & set(rcols)
    if overlap:
        raise ValueError(f"ambiguous non-key columns: {sorted(overlap)}")
    with_right = jt in (JoinType.INNER, JoinType.LEFT_OUTER)

    lt = left.drop(OVC_COL) if OVC_COL in left.columns else left
    rt = right.drop(OVC_COL) if OVC_COL in right.columns else right
    tagged = lt.withColumn(_TAG, F.lit(0)).unionByName(
        rt.withColumn(_TAG, F.lit(1)), allowMissingColumns=True
    )
    parts = num_partitions or int(
        left.sparkSession.conf.get("spark.sql.shuffle.partitions")
    )
    tagged = tagged.repartitionByRange(parts, *on) \
                   .sortWithinPartitions(*on, _TAG)

    out_fields = [StructField(c, LongType()) for c in on]
    for c in lcols:
        out_fields.append(left.schema[c])
    if with_right:
        for c in rcols:
            # right side is nullable in outer joins
            out_fields.append(
                StructField(c, right.schema[c].dataType, True)
            )
    out_fields.append(StructField(OVC_COL, LongType(), False))
    out_schema = StructType(out_fields)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        parts_ = list(batches)
        if not parts_:
            return
        pdf = pd.concat(parts_, ignore_index=True)
        if not len(pdf):
            return
        keys = pdf[on].to_numpy(dtype=np.int64)
        tags = pdf[_TAG].to_numpy()
        # Scan codes for each side's sub-stream within this partition:
        # each side is sorted by key, so encode each side separately.
        def side_stream(tag):
            idx = np.flatnonzero(tags == tag)
            codes = encode_sorted_array(keys[idx], spec)
            return [
                (tuple(int(x) for x in keys[i]), int(c), int(i))
                for i, c in zip(idx, codes)
            ]

        out_rows = list(merge_join(
            side_stream(0), side_stream(1), spec, jt
        ))
        if not out_rows:
            return
        okeys = np.array([k for k, _, _ in out_rows], dtype=np.int64)
        codes = [c for _, c, _ in out_rows]
        data = {c: okeys[:, j] for j, c in enumerate(on)}
        if with_right:
            lidx = [p[0] for _, _, p in out_rows]
            ridx = [-1 if p[1] is None else p[1] for _, _, p in out_rows]
            for c in lcols:
                data[c] = pdf[c].to_numpy()[lidx]
            rvalid = np.array(ridx) >= 0
            for c in rcols:
                vals = pdf[c].to_numpy()[np.maximum(ridx, 0)]
                col = pd.array(vals)
                data[c] = pd.Series(col).where(rvalid, other=pd.NA)
        else:
            lidx = [p for _, _, p in out_rows]
            for c in lcols:
                data[c] = pdf[c].to_numpy()[lidx]
        data[OVC_COL] = codes
        yield pd.DataFrame(data)

    return tagged.mapInPandas(run, out_schema)


def intersect_distinct_ovc(
    left: DataFrame,
    right: DataFrame,
    on: Sequence[str],
    base: int = DEFAULT_BASE,
    num_partitions: int | None = None,
) -> DataFrame:
    """``SELECT on FROM left INTERSECT SELECT on FROM right`` — the
    Figure 2 sort-based plan at DataFrame level: per-side in-stream
    duplicate removal (in the same per-partition scan) followed by a
    semi merge join that consumes the deduplicated codes."""
    from repro.sparkops.aggregate import instream_distinct
    from repro.sparkops.ovc_column import attach_ovc

    on = list(on)
    l = instream_distinct(
        attach_ovc(left.select(on), on, base, num_partitions=num_partitions),
        on, base)
    r = instream_distinct(
        attach_ovc(right.select(on), on, base, num_partitions=num_partitions),
        on, base)
    return merge_join_ovc(l, r, on, "left_semi", base, num_partitions)
