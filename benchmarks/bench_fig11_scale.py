"""Fig 11 reproduction: 32-worker scalability.

11a: normal execution — Quokka keeps ~1.9x geomean over SparkSQL-sim and
~1.9x over Trino-with-FT.
11b: kill a worker at 50% — Quokka's pipelined-parallel recovery stops
scaling (parallelism ∝ stages, not workers), so its recovery overhead
degrades relative to Spark's data-parallel recovery (paper: ~12% worse
geomean), while still beating the restart baseline and staying faster
end-to-end.
"""


def test_fig11a_scale32_performance(benchmark, harness, emit):
    rows = benchmark.pedantic(
        lambda: harness.fig6_rows(workers=[32]), rounds=1, iterations=1
    )
    emit("fig11a", rows, "Fig 11a — 32 workers, normal execution, simulated s")
    gm = [r for r in rows if r["query"] == "GEOMEAN"][0]
    assert gm["speedup_vs_spark"] > 1.3
    assert gm["speedup_vs_trino"] > 1.0
    benchmark.extra_info["geomean_vs_spark_32w"] = gm["speedup_vs_spark"]


def test_fig11b_scale32_recovery(benchmark, harness, emit):
    rows = benchmark.pedantic(
        lambda: harness.recovery_rows(32, frac=0.5), rounds=1, iterations=1
    )
    emit("fig11b", rows, "Fig 11b — 32 workers, kill at 50%, overhead ratios")
    per_q = [r for r in rows if r["query"] != "GEOMEAN"]
    assert all(r["quokka_vs_spark_e2e"] > 1.0 for r in per_q)
    assert all(r["quokka_overhead"] < r["restart_overhead"] for r in per_q)
    benchmark.extra_info["quokka_geomean_32w"] = [
        r for r in rows if r["query"] == "GEOMEAN"
    ][0]["quokka_overhead"]
