"""Fig 9 reproduction: fault-tolerance overhead during normal execution.

Overhead = runtime with FT enabled / runtime with FT off, same engine.
Paper result: Trino HDFS spooling 1.5x (4w) / 2.7x (16w) geomean (up to
4.8x on Q9); Quokka S3 spooling similar; Quokka write-ahead lineage an
order of magnitude cheaper — 1.15x (4w) / 1.06x (16w).
"""


def test_fig9_ft_overhead(benchmark, harness, emit):
    rows = benchmark.pedantic(
        lambda: harness.fig9_rows(workers=[4, 16]), rounds=1, iterations=1
    )
    emit("fig9", rows, "Fig 9 — FT overhead (ratio vs same engine, FT off)")
    gm = {r["workers"]: r for r in rows if r["query"] == "GEOMEAN"}
    for w in (4, 16):
        # WAL is an order of magnitude cheaper than spooling
        assert gm[w]["quokka_wal"] < 1.25
        assert gm[w]["trino_hdfs_spool"] > 1.25
        assert gm[w]["quokka_wal"] < gm[w]["quokka_s3_spool"]
    # spooling overhead worsens with cluster size (smaller partitions)
    assert gm[16]["trino_hdfs_spool"] > gm[4]["trino_hdfs_spool"] * 0.9
    benchmark.extra_info["wal_overhead_16w"] = gm[16]["quokka_wal"]
    benchmark.extra_info["trino_spool_16w"] = gm[16]["trino_hdfs_spool"]
