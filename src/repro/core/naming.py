"""Lineage naming scheme (paper §III-A).

Tasks (and their single output object) are named ``(stage, channel,
seq)``; ``seq`` increases monotonically within a channel and tasks
consume their inputs in order. Because a task consumes from **one
upstream channel at a time**, its lineage is just "which upstream
channel, and how many outputs" — two integers — instead of a list of
unique input names. Input (scan) tasks record the replayable source
batch index; flush tasks (final emission of a stateful operator) record
nothing beyond their kind.

Records are serialised to compact JSON-able tuples for the GCS journal.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Union

#: (stage, channel) — a channel of a stage, the unit of state & rewind.
ChannelId = tuple[int, int]
#: (stage, channel, seq) — a task and, identically, its output object.
TaskName = tuple[int, int, int]


@dataclass(frozen=True)
class ScanLineage:
    """Input-reader task: re-run by re-reading source batch ``batch_idx``."""

    batch_idx: int


@dataclass(frozen=True)
class ConsumeLineage:
    """Streaming task: consumed outputs ``[start, start+count)`` of
    upstream channel ``upstream``. ``start`` is derivable from the
    watermark but stored explicitly for O(1) replay planning."""

    upstream: ChannelId
    start: int
    count: int


@dataclass(frozen=True)
class FlushLineage:
    """Final emission of a stateful operator (inputs: the channel state)."""


LineageRecord = Union[ScanLineage, ConsumeLineage, FlushLineage]


def encode_record(rec: LineageRecord) -> list:
    """Journal encoding. Kept to a handful of ints per task — the paper's
    point is that lineage is KB-sized where spooling is MB-sized."""
    if isinstance(rec, ScanLineage):
        return ["S", rec.batch_idx]
    if isinstance(rec, ConsumeLineage):
        return ["C", rec.upstream[0], rec.upstream[1], rec.start, rec.count]
    if isinstance(rec, FlushLineage):
        return ["F"]
    raise TypeError(f"not a lineage record: {rec!r}")


def decode_record(data: list) -> LineageRecord:
    kind = data[0]
    if kind == "S":
        return ScanLineage(int(data[1]))
    if kind == "C":
        return ConsumeLineage((int(data[1]), int(data[2])), int(data[3]), int(data[4]))
    if kind == "F":
        return FlushLineage()
    raise ValueError(f"unknown lineage record kind: {data!r}")


def encode_channel(cid: ChannelId) -> str:
    """Channel ids double as journal keys, so they must be strings."""
    return f"{cid[0]}.{cid[1]}"


def decode_channel(s: str) -> ChannelId:
    a, b = s.split(".")
    return (int(a), int(b))


def encode_task(name: TaskName) -> str:
    return f"{name[0]}.{name[1]}.{name[2]}"


def decode_task(s: str) -> TaskName:
    a, b, c = s.split(".")
    return (int(a), int(b), int(c))
