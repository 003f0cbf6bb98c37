"""Spark-facing storage connector for the simulated S3.

``s3select`` registers a PySpark (4.1) Python DataSource named
``s3select`` whose reader receives Catalyst filters via ``pushFilters``
and turns the supported subset into storage-side S3 Select WHERE
clauses -- the repro-band's "custom V2 DataSource with filter pushdown
in Catalyst". ``translate`` holds the Filter -> S3 Select SQL mapping.
"""
from repro.datasource.s3select import S3SelectDataSource, ensure_registered

__all__ = ["S3SelectDataSource", "ensure_registered"]
