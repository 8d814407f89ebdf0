"""Warehouse substrate: the PySpark analogue of the paper's Presto +
Hive-Metastore + NFS + Memory-Catalog stack (DESIGN.md §4.1)."""

from repro.warehouse.catalog import MemoryCatalog  # noqa: F401
from repro.warehouse.executor import run_workload  # noqa: F401
