"""TPC-H-lite query suite: shared SQL + engine plans per query."""
