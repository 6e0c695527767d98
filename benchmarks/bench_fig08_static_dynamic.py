"""Fig 8 reproduction: dynamic task dependencies vs two static lineage
strategies (scale-equivalent small/large batch; paper used 8 vs 128).

Paper result: the better static strategy flips between cluster sizes,
and dynamic matches (or beats) the better one on most queries.
"""
from repro.harness.experiments import geomean


def test_fig8_dynamic_vs_static(benchmark, harness, emit):
    rows = benchmark.pedantic(
        lambda: harness.fig8_rows(workers=[4, 16]), rounds=1, iterations=1
    )
    emit("fig8", rows, "Fig 8 — dynamic vs static lineage, simulated s")
    # dynamic tracks the better static strategy (within 15% geomean)
    for w in (4, 16):
        ratios = [r["dyn_vs_best_static"] for r in rows if r["workers"] == w]
        assert geomean(ratios) < 1.15
    benchmark.extra_info["dyn_vs_best_static_geomean_16w"] = geomean(
        [r["dyn_vs_best_static"] for r in rows if r["workers"] == 16]
    )
