"""Operator kernels vs pandas reference implementations."""
import numpy as np
import pandas as pd
import pytest

from repro.engine.operators import HashAgg, SymmetricHashJoin, TopK


def _sorted(df, cols=None):
    cols = cols or list(df.columns)
    return df.sort_values(cols).reset_index(drop=True)[sorted(df.columns)]


@pytest.fixture()
def left_batches():
    g = np.random.default_rng(1)
    return [
        pd.DataFrame({"lk": g.integers(0, 50, 200), "lv": g.random(200)})
        for _ in range(4)
    ]


@pytest.fixture()
def right_batches():
    g = np.random.default_rng(2)
    return [
        pd.DataFrame({"rk": g.integers(0, 50, 150), "rv": g.random(150)})
        for _ in range(3)
    ]


def _reference_join(lbatches, rbatches):
    left = pd.concat(lbatches, ignore_index=True)
    right = pd.concat(rbatches, ignore_index=True)
    return left.merge(right, left_on="lk", right_on="rk")


def _drive(join, feed):
    outs = []
    for side, batch in feed:
        r = join.on_batch(side, batch)
        if r is not None:
            outs.append(r)
    return pd.concat(outs, ignore_index=True) if outs else pd.DataFrame()


@pytest.mark.parametrize("interleave", ["left_first", "right_first", "mixed"])
def test_symmetric_join_matches_reference(left_batches, right_batches, interleave):
    if interleave == "left_first":
        feed = [(0, b) for b in left_batches] + [(1, b) for b in right_batches]
    elif interleave == "right_first":
        feed = [(1, b) for b in right_batches] + [(0, b) for b in left_batches]
    else:
        feed = []
        for i in range(4):
            feed.append((0, left_batches[i]))
            if i < 3:
                feed.append((1, right_batches[i]))
    got = _drive(SymmetricHashJoin(["lk"], ["rk"]), feed)
    expected = _reference_join(left_batches, right_batches)
    pd.testing.assert_frame_equal(
        _sorted(got), _sorted(expected), check_dtype=False
    )


def test_join_emits_each_match_exactly_once(left_batches, right_batches):
    feed = [(0, left_batches[0]), (1, right_batches[0]),
            (0, left_batches[1]), (1, right_batches[1])]
    got = _drive(SymmetricHashJoin(["lk"], ["rk"]), feed)
    expected = _reference_join(left_batches[:2], right_batches[:2])
    assert len(got) == len(expected)


def test_join_multi_column_keys():
    left = pd.DataFrame({"a": [1, 1, 2], "b": [1, 2, 1], "x": [10, 20, 30]})
    right = pd.DataFrame({"c": [1, 2, 1], "d": [2, 1, 9], "y": [7, 8, 9]})
    j = SymmetricHashJoin(["a", "b"], ["c", "d"])
    outs = [j.on_batch(0, left), j.on_batch(1, right)]
    got = pd.concat([o for o in outs if o is not None], ignore_index=True)
    expected = left.merge(right, left_on=["a", "b"], right_on=["c", "d"])
    pd.testing.assert_frame_equal(
        _sorted(got), _sorted(expected), check_dtype=False
    )


def test_join_post_map_applied(left_batches, right_batches):
    j = SymmetricHashJoin(["lk"], ["rk"], post=lambda d: d[d.lv > 0.5][["lk", "lv"]])
    got = _drive(j, [(0, left_batches[0]), (1, right_batches[0])])
    if len(got):
        assert list(got.columns) == ["lk", "lv"]
        assert (got.lv > 0.5).all()


def test_join_empty_batches_are_noops():
    j = SymmetricHashJoin(["lk"], ["rk"])
    assert j.on_batch(0, None) is None
    assert j.on_batch(1, pd.DataFrame({"rk": [], "rv": []})) is None


def test_join_no_matches_returns_none():
    j = SymmetricHashJoin(["lk"], ["rk"])
    j.on_batch(0, pd.DataFrame({"lk": [1], "lv": [0.0]}))
    assert j.on_batch(1, pd.DataFrame({"rk": [99], "rv": [0.0]})) is None


def test_join_state_nbytes_grows(left_batches):
    j = SymmetricHashJoin(["lk"], ["rk"])
    j.on_batch(0, left_batches[0])
    s1 = j.state_nbytes()
    j.on_batch(0, left_batches[1])
    assert j.state_nbytes() > s1 > 0


def test_join_deterministic_replay(left_batches, right_batches):
    feed = [(0, left_batches[0]), (1, right_batches[0]), (0, left_batches[1])]
    a = _drive(SymmetricHashJoin(["lk"], ["rk"]), feed)
    b = _drive(SymmetricHashJoin(["lk"], ["rk"]), feed)
    pd.testing.assert_frame_equal(a, b)  # byte-identical, not just equal


# ---------------------------------------------------------------- HashAgg

def _agg_feed(agg, batches):
    for b in batches:
        assert agg.on_batch(0, b) is None  # aggs emit only at flush
    return agg.flush()


def test_hashagg_grouped_sums():
    g = np.random.default_rng(3)
    batches = [
        pd.DataFrame({"k": g.integers(0, 5, 100), "v": g.random(100)})
        for _ in range(5)
    ]
    agg = HashAgg(["k"], {"total": lambda d: d.v,
                          "cnt": lambda d: np.ones(len(d), dtype="int64")})
    got = _agg_feed(agg, batches)
    all_rows = pd.concat(batches)
    expected = (
        all_rows.groupby("k").agg(total=("v", "sum"), cnt=("v", "size"))
        .reset_index()
    )
    pd.testing.assert_frame_equal(
        _sorted(got), _sorted(expected), check_dtype=False
    )


def test_hashagg_global_sum_no_keys():
    batches = [pd.DataFrame({"v": [1.0, 2.0]}), pd.DataFrame({"v": [3.5]})]
    agg = HashAgg([], {"s": lambda d: d.v})
    out = _agg_feed(agg, batches)
    assert len(out) == 1 and out.s.iloc[0] == pytest.approx(6.5)


def test_hashagg_partial_then_final():
    g = np.random.default_rng(4)
    batches = [
        pd.DataFrame({"k": g.integers(0, 4, 50), "v": g.random(50)})
        for _ in range(4)
    ]
    partials = []
    for i in (0, 1):
        p = HashAgg(["k"], {"s": lambda d: d.v})
        p.on_batch(0, batches[2 * i])
        p.on_batch(0, batches[2 * i + 1])
        partials.append(p.flush())
    final = HashAgg(["k"], {"s": lambda d: d.s}, raw=False)
    for p in partials:
        final.on_batch(0, p)
    got = final.flush()
    expected = (
        pd.concat(batches).groupby("k").v.sum().reset_index(name="s")
    )
    pd.testing.assert_frame_equal(
        _sorted(got), _sorted(expected), check_dtype=False
    )


def test_hashagg_derived_map():
    agg = HashAgg(
        ["k"],
        {"s": lambda d: d.v, "n": lambda d: np.ones(len(d), dtype="int64")},
        derived=lambda d: d.assign(avg=d.s / d.n),
    )
    agg.on_batch(0, pd.DataFrame({"k": [1, 1, 2], "v": [2.0, 4.0, 10.0]}))
    out = agg.flush().set_index("k")
    assert out.loc[1, "avg"] == pytest.approx(3.0)
    assert out.loc[2, "avg"] == pytest.approx(10.0)


def test_hashagg_compaction_keeps_sums_exactly():
    agg = HashAgg(["k"], {"s": lambda d: d.v})
    agg._COMPACT_ROWS = 10  # force frequent compaction
    g = np.random.default_rng(5)
    batches = [
        pd.DataFrame({"k": g.integers(0, 3, 7), "v": g.integers(0, 100, 7)})
        for _ in range(20)
    ]
    got = _agg_feed(agg, batches)
    expected = pd.concat(batches).groupby("k").v.sum().reset_index(name="s")
    pd.testing.assert_frame_equal(
        _sorted(got), _sorted(expected), check_dtype=False
    )


def test_hashagg_empty_flush_none():
    agg = HashAgg(["k"], {"s": lambda d: d.v})
    assert agg.flush() is None


# ------------------------------------------------------------------- TopK

def test_topk_matches_sort_head():
    g = np.random.default_rng(6)
    batches = [
        pd.DataFrame({"r": g.random(40), "k": np.arange(40) + 40 * i})
        for i in range(4)
    ]
    top = TopK(["r", "k"], [False, True], 10)
    for b in batches:
        assert top.on_batch(0, b) is None
    got = top.flush().reset_index(drop=True)
    expected = (
        pd.concat(batches)
        .sort_values(["r", "k"], ascending=[False, True])
        .head(10)
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(got, expected, check_dtype=False)


def test_topk_select_projection():
    top = TopK(["r"], [False], 2, select=["k"])
    top.on_batch(0, pd.DataFrame({"r": [3.0, 1.0, 2.0], "k": [1, 2, 3]}))
    out = top.flush()
    assert list(out.columns) == ["k"]
    assert out.k.tolist() == [1, 3]


def test_topk_fewer_rows_than_k():
    top = TopK(["r"], [True], 10)
    top.on_batch(0, pd.DataFrame({"r": [2.0, 1.0]}))
    assert top.flush().r.tolist() == [1.0, 2.0]
