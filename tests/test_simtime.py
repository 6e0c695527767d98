"""Cost model + resource timelines."""
import pytest

from repro.engine.simtime import CostModel, Timeline


def test_timeline_serialises_reservations():
    t = Timeline()
    assert t.reserve(0.0, 2.0) == 2.0
    # second reservation queues behind the first even if ready earlier
    assert t.reserve(1.0, 1.0) == 3.0
    # a reservation after the horizon starts at its ready time
    assert t.reserve(10.0, 1.0) == 11.0


def test_timeline_reset():
    t = Timeline()
    t.reserve(0.0, 5.0)
    t.reset()
    assert t.reserve(0.0, 1.0) == 1.0


def test_bytes_scale_applied():
    c = CostModel(bytes_scale=1000.0, cpu_bytes_per_sec=1e9)
    assert c.cpu_time(1_000_000, 0) == pytest.approx(1.0)
    assert c.scan_time(0) == 0.0


def test_durable_latency_dominates_small_objects():
    c = CostModel()
    small = c.durable_time(10, "s3")
    assert small == pytest.approx(c.s3_lat_s, rel=0.01)
    big = c.durable_time(10_000_000, "s3")
    assert big > 10 * small


def test_hdfs_replication_costs_bandwidth():
    c = CostModel(hdfs_replication=3)
    n = 1_000_000
    assert c.durable_time(n, "hdfs") - c.hdfs_lat_s == pytest.approx(
        3 * c.scaled(n) / c.net_bytes_per_sec
    )


def test_unknown_durable_kind():
    with pytest.raises(ValueError):
        CostModel().durable_time(1, "tape")


def test_net_and_disk_times_linear():
    c = CostModel()
    assert c.net_time(2_000) == pytest.approx(2 * c.net_time(1_000))
    assert c.disk_time(2_000) == pytest.approx(2 * c.disk_time(1_000))
