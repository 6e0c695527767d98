"""Fig 7 reproduction: pipelined vs stagewise (blocking) Quokka.

Paper result: pipelined wins everywhere; ~26% (4w) / ~22% (16w) geomean
speedup on categories II+III, ~none on category I.
"""


def test_fig7_pipelined_vs_stagewise(benchmark, harness, emit):
    rows = benchmark.pedantic(
        lambda: harness.fig7_rows(workers=[4, 16]), rounds=1, iterations=1
    )
    emit("fig7", rows, "Fig 7 — pipelined vs stagewise Quokka, simulated s")
    gm = {r["workers"]: r for r in rows if r["query"] == "GEOMEAN(II+III)"}
    for w in (4, 16):
        assert gm[w]["speedup"] > 1.05  # pipelining wins on join queries
    # category I queries see little benefit (the paper's expectation)
    cat1 = [r for r in rows if r.get("cat") == "I"]
    assert all(r["speedup"] < 1.4 for r in cat1)
    benchmark.extra_info["geomean_II_III_16w"] = gm[16]["speedup"]
