"""Lineage naming scheme codecs (paper §III-A)."""
import json

import pytest

from repro.core.naming import (
    ConsumeLineage,
    FlushLineage,
    ScanLineage,
    decode_channel,
    decode_record,
    decode_task,
    encode_channel,
    encode_record,
    encode_task,
)


@pytest.mark.parametrize(
    "rec",
    [
        ScanLineage(0),
        ScanLineage(123),
        ConsumeLineage((2, 7), 0, 5),
        ConsumeLineage((0, 0), 42, 1),
        FlushLineage(),
    ],
)
def test_record_roundtrip(rec):
    assert decode_record(encode_record(rec)) == rec


def test_records_json_serialisable():
    recs = [ScanLineage(3), ConsumeLineage((1, 2), 4, 6), FlushLineage()]
    wire = json.dumps([encode_record(r) for r in recs])
    assert [decode_record(x) for x in json.loads(wire)] == recs


def test_record_compactness():
    """The paper's point: lineage is a handful of integers, not object
    lists — a consume record encodes to ≤5 scalars."""
    assert len(encode_record(ConsumeLineage((9, 9), 100, 100))) == 5
    assert len(encode_record(ScanLineage(7))) == 2
    assert len(encode_record(FlushLineage())) == 1


def test_channel_and_task_keys():
    assert decode_channel(encode_channel((3, 14))) == (3, 14)
    assert decode_task(encode_task((1, 2, 3))) == (1, 2, 3)


def test_decode_rejects_unknown():
    with pytest.raises(ValueError):
        decode_record(["X", 1])


def test_encode_rejects_non_record():
    with pytest.raises(TypeError):
        encode_record(("S", 1))
