"""Stateful single-node kernels (the paper's DuckDB/Polars analogue).

Each operator instance is one channel's *state variable* (paper Fig. 1):
``on_batch`` absorbs one upstream output and may emit rows; ``flush``
emits the final output once every upstream channel has closed and been
fully consumed. Operators are deterministic functions of the sequence of
``(upstream_idx, batch)`` calls — the property lineage-based replay
relies on: retracing the logged consumption order reproduces
byte-identical outputs.

All non-scan operators here are stateful; stateless maps/filters are
fused into scans and into join/agg ``post`` callbacks (paper §III-B:
stateless channels "are typically input readers").
"""
from __future__ import annotations

from abc import ABC, abstractmethod
from typing import Callable, Optional

import numpy as np
import pandas as pd

from .util import pdf_nbytes

MapFn = Callable[[pd.DataFrame], pd.DataFrame]


class Operator(ABC):
    """One channel's kernel + state variable."""

    @abstractmethod
    def on_batch(self, upstream_idx: int, pdf: pd.DataFrame) -> Optional[pd.DataFrame]:
        """Absorb one upstream output batch; return emitted rows or None."""

    def flush(self) -> Optional[pd.DataFrame]:
        """Final emission after all upstreams closed; None if nothing."""
        return None

    def state_nbytes(self) -> int:
        """Size of the state variable (drives checkpointing cost)."""
        return 0


class _JoinSide:
    """One side of a symmetric hash join: accumulated rows + a
    persistent key→row-positions index, maintained incrementally so each
    probe costs O(batch + matches) instead of rebuilding a hash over the
    whole accumulated side (which would make streaming joins quadratic).
    """

    def __init__(self, keys: list[str]) -> None:
        self.keys = keys
        self.chunks: list[pd.DataFrame] = []
        self.n = 0
        self.index: dict = {}
        self._cat: Optional[pd.DataFrame] = None
        self._cat_n = 0

    def append(self, pdf: pd.DataFrame) -> None:
        groups = pdf.groupby(self.keys, sort=False).indices
        for k, pos in groups.items():
            gp = pos + self.n
            prev = self.index.get(k)
            self.index[k] = gp if prev is None else np.concatenate([prev, gp])
        self.chunks.append(pdf)
        self.n += len(pdf)

    def frame(self) -> pd.DataFrame:
        if self._cat_n != self.n:
            self._cat = (
                self.chunks[0]
                if len(self.chunks) == 1
                else pd.concat(self.chunks, ignore_index=True)
            )
            self._cat_n = self.n
        return self._cat

    def probe(self, pdf: pd.DataFrame, probe_keys: list[str]):
        """Positions (mine, probe's) of all matching row pairs."""
        if not self.n:
            return None
        groups = pdf.groupby(probe_keys, sort=False).indices
        mine, theirs = [], []
        for k, ppos in groups.items():
            bpos = self.index.get(k)
            if bpos is None:
                continue
            mine.append(np.repeat(bpos, len(ppos)))
            theirs.append(np.tile(ppos, len(bpos)))
        if not mine:
            return None
        return np.concatenate(mine), np.concatenate(theirs)

    def nbytes(self) -> int:
        return sum(pdf_nbytes(c) for c in self.chunks)


class SymmetricHashJoin(Operator):
    """Streaming two-sided equi-join.

    Both sides accumulate; a new batch from side ``i`` first probes the
    accumulated other side (emitting matches exactly once) and is then
    inserted into side ``i``'s table. Correct for any interleaving of the
    two inputs, which is what lets a *dynamic* scheduler choose freely —
    and what makes the logged consumption order the only thing recovery
    must pin down.

    ``post`` is an optional fused stateless map/filter over emitted rows.
    The plan builder guarantees the two sides have disjoint column names.
    """

    def __init__(
        self,
        left_on: list[str],
        right_on: list[str],
        post: Optional[MapFn] = None,
    ) -> None:
        self.left_on, self.right_on, self.post = left_on, right_on, post
        self._sides = [_JoinSide(left_on), _JoinSide(right_on)]

    def on_batch(self, upstream_idx: int, pdf: pd.DataFrame) -> Optional[pd.DataFrame]:
        if upstream_idx not in (0, 1):
            raise ValueError(f"join has upstreams 0/1, got {upstream_idx}")
        if pdf is None or len(pdf) == 0:
            return None
        other = self._sides[1 - upstream_idx]
        probe_keys = self.left_on if upstream_idx == 0 else self.right_on
        hit = other.probe(pdf, probe_keys)
        out = None
        if hit is not None:
            opos, ppos = hit
            other_rows = other.frame().iloc[opos].reset_index(drop=True)
            probe_rows = pdf.iloc[ppos].reset_index(drop=True)
            if upstream_idx == 0:  # keep left columns first
                out = pd.concat([probe_rows, other_rows], axis=1)
            else:
                out = pd.concat([other_rows, probe_rows], axis=1)
        self._sides[upstream_idx].append(pdf)
        if out is not None and len(out) and self.post is not None:
            out = self.post(out)
        return out if out is not None and len(out) else None

    def state_nbytes(self) -> int:
        return self._sides[0].nbytes() + self._sides[1].nbytes()


class HashAgg(Operator):
    """Hash aggregation where every aggregate is a SUM of an expression.

    This covers the reproduced queries: ``count(*)`` is the sum of ones,
    ``avg`` and ratio aggregates are derived from sums in ``derived`` at
    flush time. Two roles:

    * ``partial``: accumulates partial sums per group from raw rows and
      emits them only at flush — the *aggregation pushdown* the paper
      credits for Quokka's near-zero spool volume on TPC-H Q1/Q6.
    * ``final``: merges partial frames (or raw rows when no pushdown,
      the Trino-sim plan shape), then applies ``derived`` at flush.

    ``aggs`` maps output column -> expression over the input batch.
    ``raw`` distinguishes a final agg fed raw rows (compute expressions)
    from one fed partials (columns already computed; just sum).
    """

    _DUMMY = "__g"

    def __init__(
        self,
        keys: list[str],
        aggs: dict[str, Callable[[pd.DataFrame], pd.Series]],
        *,
        raw: bool = True,
        derived: Optional[MapFn] = None,
    ) -> None:
        self.keys, self.aggs, self.raw, self.derived = keys, aggs, raw, derived
        self._chunks: list[pd.DataFrame] = []
        self._rows = 0

    _COMPACT_ROWS = 20_000  # amortised re-aggregation threshold

    def _contrib(self, pdf: pd.DataFrame) -> pd.DataFrame:
        if self.raw:
            data = {k: pdf[k] for k in self.keys}
            for col, fn in self.aggs.items():
                data[col] = np.asarray(fn(pdf))
            out = pd.DataFrame(data)
        else:
            out = pdf[self.keys + list(self.aggs)].copy()
        if not self.keys:
            out[self._DUMMY] = 0
        return out

    def _compact(self) -> Optional[pd.DataFrame]:
        if not self._chunks:
            return None
        merged = (
            self._chunks[0]
            if len(self._chunks) == 1
            else pd.concat(self._chunks, ignore_index=True)
        )
        gkeys = self.keys if self.keys else [self._DUMMY]
        out = merged.groupby(gkeys, as_index=False, sort=True).sum()
        self._chunks = [out]
        self._rows = len(out)
        return out

    def on_batch(self, upstream_idx: int, pdf: pd.DataFrame) -> None:
        if pdf is None or len(pdf) == 0:
            return None
        contrib = self._contrib(pdf)
        self._chunks.append(contrib)
        self._rows += len(contrib)
        # Amortised compaction keeps the state variable bounded by the
        # group count (the paper's hash-table-state model) without a full
        # re-aggregation per batch; thresholds are deterministic, so
        # replayed consumption sequences compact identically.
        if self._rows >= self._COMPACT_ROWS:
            self._compact()
        return None

    def flush(self) -> Optional[pd.DataFrame]:
        out = self._compact()
        if out is None:
            return None
        if not self.keys:
            out = out.drop(columns=[self._DUMMY])
        if self.derived is not None:
            out = self.derived(out)
        return out if len(out) else None

    def state_nbytes(self) -> int:
        return sum(pdf_nbytes(c) for c in self._chunks)


class TopK(Operator):
    """Order-by/limit tail stage (single channel).

    Keeps the best ``k`` rows by ``sort_by``/``ascending``; the plan
    builder must include full tie-break columns so the result set is
    deterministic (required both by replay and by the DuckDB oracle).
    """

    def __init__(
        self,
        sort_by: list[str],
        ascending: list[bool],
        k: int,
        select: Optional[list[str]] = None,
    ) -> None:
        self.sort_by, self.ascending, self.k, self.select = (
            sort_by,
            ascending,
            k,
            select,
        )
        self._state: Optional[pd.DataFrame] = None

    def on_batch(self, upstream_idx: int, pdf: pd.DataFrame) -> None:
        if pdf is None or len(pdf) == 0:
            return None
        merged = (
            pdf
            if self._state is None
            else pd.concat([self._state, pdf], ignore_index=True)
        )
        self._state = (
            merged.sort_values(self.sort_by, ascending=self.ascending)
            .head(self.k)
            .reset_index(drop=True)
        )
        return None

    def flush(self) -> Optional[pd.DataFrame]:
        if self._state is None:
            return None
        out = self._state
        if self.select is not None:
            out = out[self.select]
        return out

    def state_nbytes(self) -> int:
        return pdf_nbytes(self._state)
