"""Sorted columnar storage and log-structured merge-forest (Section 4.10).

``columnar`` stores sorted runs with run-length-encoded key columns;
scanning reconstructs offset-value codes from RLE metadata alone — no
column value accesses or comparisons. ``lsm`` stacks such runs into a
log-structured merge-forest with ingest, compaction, and merged scans.
``datasource`` exposes the format to Spark as a Python DataSource.
"""
