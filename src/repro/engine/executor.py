"""Discrete-event executor for the pipelined engine substrate.

Runs a :class:`~repro.engine.plan.Plan` over real batch data on a
simulated cluster (:mod:`repro.engine.cluster`), with simulated time from
:mod:`repro.engine.simtime`. Kernels execute for real; the clock does
not. One :class:`Executor` instance = one query run (single-use).

Execution follows the paper:

* **Algorithm 1** (write-ahead lineage): a task gathers only inputs
  whose lineage is committed in the GCS, executes, pushes slices to
  consumer inboxes, backs the full output up to local NVMe (or spools it
  durably), and then commits {lineage record, output location, channel
  close} in a single GCS transaction. A worker failure between launch
  and completion cancels the task with no commit and no effects.
* **Algorithm 2** (recovery): on a failure event the coordinator detects
  it after ``detect_delay_s``, raises the GCS barrier flag (in-flight
  tasks on live workers drain; no new ones start), prunes dead backup
  locations, runs :func:`repro.core.recovery.plan_recovery`, applies the
  plan (rewound channels on new workers retrace their logged lineage
  exactly; replays/rescans are queued on their assigned workers), and
  resumes. Nested failures simply re-enter this path.

Execution modes (the experiment matrix; DESIGN.md §3):

* ``exec_mode``: ``pipelined`` | ``stagewise`` (a stage's channels may
  not start until every upstream stage has closed — SparkSQL-like).
* ``dep_mode``: ``dynamic`` (consume all available outputs from the
  richest upstream channel) | ``static`` (consume exactly
  ``static_batch`` outputs, waiting for them if necessary).
* ``ft_mode``: ``none`` | ``wal`` | ``spool_s3`` | ``spool_hdfs`` |
  ``checkpoint``. With ``none`` there are no backups at all, so a
  failure degenerates to re-executing the whole pipeline — the paper's
  "restart from scratch" baseline, measured rather than assumed.
* ``recovery_mode``: ``pipelined_parallel`` (Quokka: stateful channels
  retrace task-by-task, different stages on different workers) |
  ``data_parallel`` (Spark-sim: a rewound channel recomputes its entire
  logged history as one monolithic task once all inputs are present —
  Spark's task granularity — so lost channels spread across the cluster).
"""
from __future__ import annotations

import heapq
from collections import deque
from dataclasses import dataclass, field
from typing import Optional

import pandas as pd

from ..core.gcs import Gcs
from ..core.naming import (
    ChannelId,
    ConsumeLineage,
    FlushLineage,
    LineageRecord,
    ScanLineage,
    TaskName,
)
from ..core.recovery import plan_recovery
from ..core.wal import DURABLE, LineageStore
from .cluster import DurableStore, Worker
from .operators import Operator
from .partition import partition
from .plan import OpStage, Plan, ScanStage
from .simtime import CostModel
from .util import concat_batches, pdf_nbytes, row_nbytes


@dataclass
class ExecConfig:
    n_workers: int = 4
    slots_per_worker: int = 2
    width: Optional[int] = None  # channels per data-parallel stage; default n_workers
    exec_mode: str = "pipelined"
    dep_mode: str = "dynamic"
    static_batch: int = 8
    #: dynamic mode consumes everything available, but not before this
    #: many upstream outputs have accumulated (unless the upstream
    #: closed) — models TaskManager poll granularity / "maximize the
    #: number of input batches consumed" (paper §IV-A).
    dynamic_min: int = 4
    ft_mode: str = "wal"
    recovery_mode: str = "pipelined_parallel"
    ckpt_every: int = 4
    input_batches: int = 16
    cost: CostModel = field(default_factory=CostModel)
    journal_path: Optional[str] = None


@dataclass
class Failure:
    worker: int
    at_time: float


@dataclass
class RunResult:
    df: pd.DataFrame
    sim_time: float
    stats: dict


class ChannelRt:
    """Runtime state of one channel (TaskManager-side view)."""

    def __init__(
        self,
        cid: ChannelId,
        spec,
        worker: int,
        upstream_cids: list[ChannelId],
        uidx: dict[ChannelId, int],
        op: Optional[Operator],
        scan_batches: list[int],
    ) -> None:
        self.cid = cid
        self.spec = spec
        self.worker = worker
        self.upstream_cids = upstream_cids
        self.uidx = uidx
        self.op = op
        self.scan_batches = scan_batches
        self.next_seq = 0
        self.retrace = 0  # replay committed lineage for seq < retrace
        self.retrace_records: list[LineageRecord] = []
        self.monolithic = False
        self.watermark: dict[ChannelId, int] = {}
        self.inbox: dict[ChannelId, dict[int, Optional[pd.DataFrame]]] = {}
        self.flushed = False
        self.active = False
        self.started = False
        self.done = False
        self.exec_count = 0

    def avail(self, u: ChannelId) -> int:
        """Consecutive inputs from ``u`` present at the watermark."""
        box = self.inbox.get(u, {})
        w = self.watermark.get(u, 0)
        n = 0
        while (w + n) in box:
            n += 1
        return n


class Executor:
    def __init__(
        self,
        plan: Plan,
        tables: dict[str, list[pd.DataFrame]],
        cfg: ExecConfig,
        store: Optional[LineageStore] = None,
    ) -> None:
        self.plan = plan
        self.tables = tables
        self.cfg = cfg
        self.cost = cfg.cost
        self.store = store or LineageStore(Gcs(cfg.journal_path))
        self.durable = DurableStore()
        self.workers = [Worker(i, cfg.slots_per_worker) for i in range(cfg.n_workers)]
        self._ran = False

        # -- instantiate channels ------------------------------------------
        # Stage widths: scans (stateless input readers) use every task
        # slot in the cluster; stateful stages get one channel per worker
        # (one TaskManager per node, paper §IV-A); "aligned" consumers
        # (partial-agg pushdown) inherit their producer's width.
        self.widths: list[int] = []
        for sid, spec in enumerate(plan.stages):
            if spec.n_channels:
                w = spec.n_channels
            elif cfg.width:
                w = cfg.width
            elif isinstance(spec, ScanStage):
                w = cfg.n_workers * cfg.slots_per_worker
            else:
                w = cfg.n_workers
            if isinstance(spec, OpStage):
                for i, pk in enumerate(spec.partition_keys):
                    if pk == "aligned":
                        w = self.widths[spec.upstreams[i]]
            self.widths.append(w)
        self.channels: dict[ChannelId, ChannelRt] = {}
        for sid, spec in enumerate(plan.stages):
            for ch in range(self.widths[sid]):
                cid = (sid, ch)
                # An "aligned" upstream is a fused pipe: this channel is
                # wired only to its same-index producer, not to every
                # channel of the upstream stage.
                ups: list[ChannelId] = []
                uidx: dict[ChannelId, int] = {}
                if isinstance(spec, OpStage):
                    for i, up in enumerate(spec.upstreams):
                        if spec.partition_keys[i] == "aligned":
                            ups.append((up, ch))
                            uidx[(up, ch)] = i
                        else:
                            for uch in range(self.widths[up]):
                                ups.append((up, uch))
                                uidx[(up, uch)] = i
                worker = ch % cfg.n_workers
                if isinstance(spec, ScanStage):
                    n_batches = len(tables[spec.table])
                    batches = list(range(ch, n_batches, self.widths[sid]))
                    rt = ChannelRt(cid, spec, worker, ups, uidx, None, batches)
                else:
                    rt = ChannelRt(cid, spec, worker, ups, uidx, spec.make_op(), [])
                self.channels[cid] = rt
                self.store.set_assignment(cid, worker)

        # Stages whose consumer edge is "aligned" are fused pipes (scan →
        # partial agg on the same worker): no shuffle crosses the edge, so
        # their outputs are neither backed up nor spooled — recovery
        # re-reads the replayable source instead (fused-operator model).
        self.fused_out: list[bool] = []
        for sid in range(len(plan.stages)):
            cons = plan.consumer_of(sid)
            self.fused_out.append(
                cons is not None
                and plan.stages[cons[0]].partition_keys[cons[1]] == "aligned"
            )

        self.host: dict[int, list[ChannelId]] = {w.wid: [] for w in self.workers}
        for cid, rt in sorted(self.channels.items()):
            self.host[rt.worker].append(cid)
        self._cursor: dict[int, int] = {w.wid: 0 for w in self.workers}

        # -- event machinery -------------------------------------------------
        self._heap: list[tuple[float, int, str, int]] = []
        self._payloads: dict[int, dict] = {}
        self._counter = 0
        self._cancelled: set[int] = set()
        self._active_eids: dict[int, set[int]] = {w.wid: set() for w in self.workers}
        self.n_active = 0
        self.paused = False
        self.pending_recover = False
        self.dead: set[int] = set()
        self.special: dict[int, deque] = {w.wid: deque() for w in self.workers}
        self.client: dict[tuple[ChannelId, int], Optional[pd.DataFrame]] = {}
        #: committed watermark snapshot taken at each recovery, used by
        #: retracing producers to suppress provably-redundant re-pushes.
        self._wm_snap: dict[ChannelId, dict[ChannelId, int]] = {}
        self.stats = {
            "n_tasks": 0,
            "n_replays": 0,
            "n_rescans": 0,
            "n_recoveries": 0,
            "rewound": [],
            "exec_count": {},
            "spooled_bytes": 0,
        }

    # ------------------------------------------------------------------ events

    def _push(self, t: float, kind: str, payload: dict) -> int:
        self._counter += 1
        eid = self._counter
        self._payloads[eid] = payload
        heapq.heappush(self._heap, (t, eid, kind, eid))
        return eid

    # ------------------------------------------------------------------- run

    def run(self, failures: tuple[Failure, ...] | list[Failure] = ()) -> RunResult:
        if self._ran:
            raise RuntimeError("Executor instances are single-use")
        self._ran = True
        for cid, rt in self.channels.items():
            if isinstance(rt.spec, ScanStage) and not rt.scan_batches:
                self.store.gcs.set("closed", f"{cid[0]}.{cid[1]}", 0)
                rt.done = True
        for f in failures:
            self._push(f.at_time, "fail", {"worker": f.worker})
        self._schedule_pass(0.0)
        now = 0.0
        while self._heap:
            t, _, kind, eid = heapq.heappop(self._heap)
            payload = self._payloads.pop(eid)
            now = max(now, t)
            if eid in self._cancelled:
                self._cancelled.discard(eid)
                continue
            if kind == "done":
                self._apply_done(now, eid, payload)
            elif kind == "fail":
                self._apply_fail(now, payload["worker"])
            elif kind == "detect":
                self._apply_detect(now)
            elif kind == "recover":
                self._apply_recover(now)
            else:  # pragma: no cover
                raise AssertionError(kind)

        not_done = [cid for cid, rt in self.channels.items() if not rt.done]
        if not_done:
            raise RuntimeError(
                f"{self.plan.name}: deadlock, channels not done: {not_done[:8]} "
                f"(of {len(not_done)}); paused={self.paused}"
            )
        frames = [self.client[k] for k in sorted(self.client, key=lambda k: (k[0], k[1]))]
        df = concat_batches(frames)
        if df is None:
            df = pd.DataFrame()
        self.stats["exec_count"] = {
            cid: rt.exec_count for cid, rt in self.channels.items()
        }
        self.stats["gcs_txns"] = self.store.gcs.txn_count
        return RunResult(df=df, sim_time=now, stats=dict(self.stats))

    # -------------------------------------------------------------- scheduling

    def _stage_ready(self, sid: int) -> bool:
        if self.cfg.exec_mode != "stagewise":
            return True
        for up in self.plan.stages[sid].upstreams:
            for ch in range(self.widths[up]):
                if self.store.closed_total((up, ch)) is None:
                    return False
        return True

    def _schedule_pass(self, now: float, wids: Optional[set[int]] = None) -> None:
        """Try to fill free slots. ``wids`` limits the scan to workers
        whose state may have changed (their task finished, or a channel
        they host just received a delivery/commit) — every event that can
        make a channel runnable touches its worker, so dormant workers
        need no re-scan."""
        if self.paused:
            return
        workers = (
            self.workers
            if wids is None
            else [self.workers[i] for i in sorted(wids)]
        )
        for w in workers:
            if not w.alive:
                continue
            while w.free_slots > 0:
                if self.special[w.wid]:
                    item = self.special[w.wid].popleft()
                    self._launch_special(now, w, item)
                    continue
                launched = self._launch_some_channel(now, w)
                if not launched:
                    break

    def _launch_some_channel(self, now: float, w: Worker) -> bool:
        cids = self.host[w.wid]
        n = len(cids)
        if n == 0:
            return False
        start = self._cursor[w.wid] % n
        for off in range(n):
            cid = cids[(start + off) % n]
            rt = self.channels[cid]
            if rt.active or rt.done:
                continue
            desc = self._build_task(rt)
            if desc is not None:
                self._cursor[w.wid] = (start + off + 1) % n
                self._launch(now, w, rt, desc)
                return True
        return False

    # -------------------------------------------------------- task construction

    def _build_task(self, rt: ChannelRt) -> Optional[dict]:
        """Gather inputs and execute the kernel eagerly (effects are held
        in the returned descriptor and applied at the completion event;
        cancellation discards them together with the channel state)."""
        if not self._stage_ready(rt.cid[0]):
            return None
        if isinstance(rt.spec, ScanStage):
            return self._build_scan(rt)
        if rt.next_seq < rt.retrace:
            return self._build_retrace(rt)
        return self._build_streaming(rt)

    def _build_scan(self, rt: ChannelRt) -> Optional[dict]:
        if rt.next_seq >= len(rt.scan_batches):
            return None
        seq = rt.next_seq
        batch_idx = rt.scan_batches[seq]
        retrace = seq < rt.retrace
        if retrace:
            rec = rt.retrace_records[seq]
            assert isinstance(rec, ScanLineage) and rec.batch_idx == batch_idx
        raw = self.tables[rt.spec.table][batch_idx]
        out = rt.spec.map_fn(raw) if rt.spec.map_fn else raw
        if out is not None and len(out) == 0:
            out = None
        close = len(rt.scan_batches) if seq == len(rt.scan_batches) - 1 else None
        return {
            "type": "scan",
            "outputs": [(seq, out)],
            "records": [ScanLineage(batch_idx)],
            "bytes_in": pdf_nbytes(raw),
            "scan": True,
            "close": close,
            "retrace": retrace,
        }

    def _gather(self, rt: ChannelRt, u: ChannelId, start: int, k: int):
        """Consume outputs [start, start+k) of ``u`` into the operator.

        The k batches are concatenated into one kernel call: since a task
        consumes from a single upstream channel, the operator state other
        batches probe against is unchanged within the task, so this is
        output-equivalent to per-batch calls (and is how a real engine
        would hand a morsel set to DuckDB/Polars).
        """
        uidx = rt.uidx[u]
        box = rt.inbox.get(u, {})
        batches = [box.pop(s) for s in range(start, start + k)]
        bytes_in = sum(pdf_nbytes(b) for b in batches)
        merged = concat_batches(batches)
        out = None
        if merged is not None:
            out = rt.op.on_batch(uidx, merged)
            if out is not None and not len(out):
                out = None
        rt.watermark[u] = start + k
        return out, bytes_in

    def _build_retrace(self, rt: ChannelRt) -> Optional[dict]:
        recs = rt.retrace_records
        if rt.monolithic:
            # Spark-sim granularity: the whole logged history is one task.
            for i in range(rt.next_seq, rt.retrace):
                rec = recs[i]
                if isinstance(rec, ConsumeLineage):
                    box = rt.inbox.get(rec.upstream, {})
                    if any((rec.start + j) not in box for j in range(rec.count)):
                        return None
            outputs, records, bytes_in = [], [], 0
            for i in range(rt.next_seq, rt.retrace):
                rec = recs[i]
                if isinstance(rec, ConsumeLineage):
                    out, b = self._gather(rt, rec.upstream, rec.start, rec.count)
                    bytes_in += b
                elif isinstance(rec, FlushLineage):
                    out = rt.op.flush()
                    rt.flushed = True
                else:  # pragma: no cover - scans never retrace via this path
                    raise AssertionError(rec)
                outputs.append((i, out))
                records.append(rec)
            return {
                "type": "consume",
                "outputs": outputs,
                "records": records,
                "bytes_in": bytes_in,
                "scan": False,
                "close": None,
                "retrace": True,
            }
        rec = recs[rt.next_seq]
        if isinstance(rec, ConsumeLineage):
            box = rt.inbox.get(rec.upstream, {})
            if any((rec.start + j) not in box for j in range(rec.count)):
                return None
            out, bytes_in = self._gather(rt, rec.upstream, rec.start, rec.count)
            return {
                "type": "consume",
                "outputs": [(rt.next_seq, out)],
                "records": [rec],
                "bytes_in": bytes_in,
                "scan": False,
                "close": None,
                "retrace": True,
            }
        if isinstance(rec, FlushLineage):
            out = rt.op.flush()
            rt.flushed = True
            return {
                "type": "flush",
                "outputs": [(rt.next_seq, out)],
                "records": [rec],
                "bytes_in": 0,
                "scan": False,
                "close": None,
                "retrace": True,
            }
        raise AssertionError(rec)  # pragma: no cover

    def _skip_empty(self, rt: ChannelRt) -> None:
        """Advance watermarks over empty-slice prefixes without a task.

        A real engine does not push empty shuffle partitions; consuming
        one is a no-op for the operator state, so skipping them outside
        any task neither needs lineage (replayed outputs are unaffected)
        nor violates the committed-lineage invariant. This is pure
        sequence-number bookkeeping for closure detection.
        """
        for u in rt.upstream_cids:
            box = rt.inbox.get(u)
            if not box:
                continue
            w = rt.watermark.get(u, 0)
            moved = False
            while w in box and box[w] is None:
                del box[w]
                w += 1
                moved = True
            if moved:
                rt.watermark[u] = w

    def _build_streaming(self, rt: ChannelRt) -> Optional[dict]:
        self._skip_empty(rt)
        best_u, best_avail = None, 0
        all_closed_and_drained = True
        for u in rt.upstream_cids:
            # Algorithm 1: only inputs with committed lineage are eligible.
            avail = rt.avail(u)
            if avail:
                assert self.store.is_committed(u, rt.watermark.get(u, 0))
            closed = self.store.closed_total(u)
            if closed is None or rt.watermark.get(u, 0) + avail < closed:
                all_closed_and_drained = False
            remaining = None if closed is None else closed - rt.watermark.get(u, 0)
            drained_u = remaining is not None and avail == remaining and avail > 0
            if self.cfg.dep_mode == "static":
                if avail >= self.cfg.static_batch:
                    take = self.cfg.static_batch
                elif drained_u:
                    take = avail
                else:
                    take = 0
            else:
                take = avail if (avail >= self.cfg.dynamic_min or drained_u) else 0
            if take > best_avail:
                best_u, best_avail = u, take

        if best_u is not None:
            start = rt.watermark.get(best_u, 0)
            out, bytes_in = self._gather(rt, best_u, start, best_avail)
            return {
                "type": "consume",
                "outputs": [(rt.next_seq, out)],
                "records": [ConsumeLineage(best_u, start, best_avail)],
                "bytes_in": bytes_in,
                "scan": False,
                "close": None,
                "retrace": False,
            }

        if all_closed_and_drained and not rt.flushed:
            # All upstream outputs consumed: emit the state variable.
            drained = all(
                rt.watermark.get(u, 0) == self.store.closed_total(u)
                for u in rt.upstream_cids
            )
            if drained:
                out = rt.op.flush()
                rt.flushed = True
                return {
                    "type": "flush",
                    "outputs": [(rt.next_seq, out)],
                    "records": [FlushLineage()],
                    "bytes_in": 0,
                    "scan": False,
                    "close": rt.next_seq + 1,
                    "retrace": False,
                }
        return None

    # ------------------------------------------------------------------ launch

    def _slices_for(self, cid: ChannelId, out: Optional[pd.DataFrame]):
        """Partition one output by the consumer stage's keys."""
        sid = cid[0]
        cons = self.plan.consumer_of(sid)
        if cons is None:
            return None, []
        cstage, uidx = cons
        keys = self.plan.stages[cstage].partition_keys[uidx]
        n = self.widths[cstage]
        if keys == "aligned":
            assert n == self.widths[sid], "aligned stages must have equal width"
            slices: list[Optional[pd.DataFrame]] = [None] * n
            slices[cid[1]] = out if (out is not None and len(out)) else None
            return cstage, slices
        return cstage, partition(out, keys, n)

    def _deliveries_for(self, cid: ChannelId, seq: int, out):
        """(dest, producer, seq, slice) tuples for one output. A fused
        (aligned) producer delivers only to its twin channel."""
        cstage, slices = self._slices_for(cid, out)
        if cstage is None:
            return []
        if self.fused_out[cid[0]]:
            dest = (cstage, cid[1])
            return [(dest, cid, seq, slices[cid[1]])]
        return [
            ((cstage, ch), cid, seq, sl) for ch, sl in enumerate(slices)
        ]

    def _launch(self, now: float, w: Worker, rt: ChannelRt, desc: dict) -> None:
        cfg, cost = self.cfg, self.cost
        sid = rt.cid[0]
        n_out = len(desc["outputs"])
        rt.next_seq += n_out
        rt.active = True
        w.free_slots -= 1

        deliveries = []  # (dest_cid, u_cid, seq, slice)
        bytes_out = 0
        remote_bytes = 0
        remote_slices = 0
        retrace = desc["retrace"]
        for seq, out in desc["outputs"]:
            bytes_out += pdf_nbytes(out)
            rowb = row_nbytes(out) if out is not None else 0
            for dest, u, s, sl in self._deliveries_for(rt.cid, seq, out):
                drt = self.channels[dest]
                if retrace and drt.retrace == 0:
                    # A retracing producer consults the consumers'
                    # *committed* watermarks in the GCS and skips
                    # re-transmitting outputs they provably consumed.
                    if self._wm_snap.get(dest, {}).get(u, 0) > s:
                        continue
                deliveries.append((dest, u, s, sl))
                if drt.worker != w.wid and sl is not None:
                    remote_bytes += rowb * len(sl)
                    remote_slices += 1

        t = now + cost.task_overhead_s
        if not rt.started and cfg.exec_mode == "stagewise":
            t += cost.stage_sched_s
        rt.started = True
        if desc["scan"]:
            t += cost.scan_time(desc["bytes_in"])
        else:
            t += cost.cpu_time(desc["bytes_in"], bytes_out)
            if cfg.exec_mode == "stagewise" and desc["bytes_in"]:
                # Blocking engines materialise shuffle data: consumers
                # re-read spilled partitions from disk (Spark's shuffle
                # fetch); pipelined push engines hand batches RAM-to-RAM.
                t = w.disk.reserve(t, cost.disk_time(desc["bytes_in"]))
        if remote_bytes or remote_slices:
            t = w.nic.reserve(
                t, cost.net_time(remote_bytes) + cost.push_lat_s * remote_slices
            )
        ft = cfg.ft_mode
        fused = self.fused_out[sid]
        if ft in ("wal", "checkpoint"):
            if bytes_out and not fused:
                t = w.disk.reserve(t, cost.disk_time(bytes_out))
            t += cost.gcs_txn_s
        elif ft in ("spool_s3", "spool_hdfs"):
            kind = "s3" if ft == "spool_s3" else "hdfs"
            dur = 0.0
            if not fused:
                dur = sum(
                    cost.durable_time(pdf_nbytes(out), kind)
                    for seq, out in desc["outputs"]
                    if not (
                        desc["retrace"]
                        and (rt.cid[0], rt.cid[1], seq) in self.durable
                    )
                )
            if dur:
                t = w.nic.reserve(t, dur)
            t += cost.gcs_txn_s
        if ft == "checkpoint" and rt.op is not None:
            last_seq = desc["outputs"][-1][0]
            if (last_seq + 1) % cfg.ckpt_every == 0:
                t = w.nic.reserve(t, cost.durable_time(rt.op.state_nbytes(), "s3"))

        eid = self._push(
            t,
            "done",
            {
                "kind": "task",
                "worker": w.wid,
                "cid": rt.cid,
                "desc": desc,
                "deliveries": deliveries,
                "bytes_out": bytes_out,
            },
        )
        self._active_eids[w.wid].add(eid)
        self.n_active += 1

    def _launch_special(self, now: float, w: Worker, item: tuple) -> None:
        cost = self.cost
        kind = item[0]
        w.free_slots -= 1
        if kind == "replay":
            _, source, dest = item
            owner_loc = self.store.location(source)
            if owner_loc == DURABLE:
                full = self.durable.get(source)
            else:
                # The planner only schedules replays whose backup location
                # is a live worker; a missing key here is a protocol bug.
                full = w.backups[source]
            cstage, slices = self._slices_for((source[0], source[1]), full)
            sl = slices[dest[1]] if slices else None
            # Upstream backups are stored pre-partitioned (as Spark's map
            # outputs are), so a replay reads and ships only the slice
            # the rewound consumer needs.
            t = now + cost.task_overhead_s
            if owner_loc == DURABLE:
                t = w.nic.reserve(
                    t, cost.s3_lat_s + cost.net_time(pdf_nbytes(sl))
                )
            else:
                t = w.disk.reserve(t, cost.disk_time(pdf_nbytes(sl)))
                dw = self.channels[dest].worker
                if dw != w.wid and sl is not None:
                    t = w.nic.reserve(t, cost.net_time(pdf_nbytes(sl)) + cost.push_lat_s)
            payload = {
                "kind": "replay",
                "worker": w.wid,
                "source": source,
                "dest": dest,
                "slice": sl,
            }
        elif kind == "rescan":
            _, name, batch_idx = item
            cid = (name[0], name[1])
            spec = self.plan.stages[name[0]]
            raw = self.tables[spec.table][batch_idx]
            out = spec.map_fn(raw) if spec.map_fn else raw
            if out is not None and len(out) == 0:
                out = None
            t = now + cost.task_overhead_s + cost.scan_time(pdf_nbytes(raw))
            if (
                self.cfg.ft_mode in ("wal", "checkpoint")
                and out is not None
                and not self.fused_out[name[0]]
            ):
                t = w.disk.reserve(t, cost.disk_time(pdf_nbytes(out)))
            payload = {
                "kind": "rescan",
                "worker": w.wid,
                "name": name,
                "out": out,
            }
        else:  # pragma: no cover
            raise AssertionError(kind)
        eid = self._push(t, "done", payload)
        self._active_eids[w.wid].add(eid)
        self.n_active += 1

    # ------------------------------------------------------------------- apply

    def _deliver(self, dest: ChannelId, u: ChannelId, seq: int, sl) -> None:
        drt = self.channels[dest]
        if not self.workers[drt.worker].alive:
            return
        if drt.watermark.get(u, 0) > seq:
            return  # already consumed (re-transmission after recovery)
        box = drt.inbox.setdefault(u, {})
        if seq not in box:
            box[seq] = sl

    def _finish_event(
        self, now: float, eid: int, wid: int, touched: set[int]
    ) -> None:
        self._active_eids[wid].discard(eid)
        self.n_active -= 1
        w = self.workers[wid]
        if w.alive:
            w.free_slots += 1
        if self.paused:
            if self.n_active == 0 and self.pending_recover:
                self.pending_recover = False
                self._push(now, "recover", {})
        else:
            touched.add(wid)
            self._schedule_pass(now, touched)

    def _apply_done(self, now: float, eid: int, p: dict) -> None:
        wid = p["worker"]
        touched: set[int] = set()
        if p["kind"] == "task":
            rt = self.channels[p["cid"]]
            desc = p["desc"]
            w = self.workers[wid]
            ft = self.cfg.ft_mode
            # Backup / spool, then commit, then deliver: consumers only ever
            # see outputs whose lineage is committed (the core invariant).
            fused = self.fused_out[rt.cid[0]]
            for (seq, out), rec in zip(desc["outputs"], desc["records"]):
                name: TaskName = (rt.cid[0], rt.cid[1], seq)
                loc: Optional[int | str] = None
                if fused:
                    loc = "fused"  # intra-channel pipe: nothing persisted
                elif ft in ("wal", "checkpoint"):
                    w.backup(name, out)
                    loc = wid
                elif ft in ("spool_s3", "spool_hdfs"):
                    if name not in self.durable:
                        self.durable.put(name, out, pdf_nbytes(out))
                        self.stats["spooled_bytes"] += pdf_nbytes(out)
                    loc = DURABLE
                if not desc["retrace"]:
                    close = desc["close"] if seq == desc["outputs"][-1][0] else None
                    self.store.commit_task(
                        rt.cid, seq, rec, loc if loc is not None else "none", close
                    )
                elif loc is not None:
                    self.store.set_location(name, loc)
            for dest, u, seq, sl in p["deliveries"]:
                self._deliver(dest, u, seq, sl)
                touched.add(self.channels[dest].worker)
            if rt.cid[0] == self.plan.final_stage:
                for seq, out in desc["outputs"]:
                    self.client.setdefault((rt.cid, seq), out)
            rt.active = False
            rt.exec_count += 1
            self.stats["n_tasks"] += 1
            if desc["close"] is not None and self.cfg.exec_mode == "stagewise":
                # A channel closing can flip a whole stage to ready; wake
                # every worker (stage-readiness is global state).
                touched.update(w2.wid for w2 in self.workers if w2.alive)
            if desc["retrace"] and rt.next_seq >= rt.retrace:
                rt.retrace = 0
                rt.retrace_records = []
                rt.monolithic = False
            if desc["close"] is not None or (
                self.store.closed_total(rt.cid) is not None
                and rt.next_seq >= self.store.lineage_len(rt.cid)
            ):
                if not desc["retrace"] or rt.retrace == 0:
                    rt.done = True
        elif p["kind"] == "replay":
            self.stats["n_replays"] += 1
            self._deliver(p["dest"], (p["source"][0], p["source"][1]), p["source"][2], p["slice"])
            touched.add(self.channels[p["dest"]].worker)
        elif p["kind"] == "rescan":
            self.stats["n_rescans"] += 1
            name, out = p["name"], p["out"]
            cid = (name[0], name[1])
            if (
                self.cfg.ft_mode in ("wal", "checkpoint")
                and not self.fused_out[name[0]]
            ):
                self.workers[wid].backup(name, out)
                self.store.set_location(name, wid)
            for dest, u, s, sl in self._deliveries_for(cid, name[2], out):
                self._deliver(dest, u, s, sl)
                touched.add(self.channels[dest].worker)
            if name[0] == self.plan.final_stage:
                self.client.setdefault((cid, name[2]), out)
        self._finish_event(now, eid, wid, touched)

    # ----------------------------------------------------------------- failure

    def _apply_fail(self, now: float, wid: int) -> None:
        w = self.workers[wid]
        if not w.alive:
            return
        if all(rt.done for rt in self.channels.values()):
            return  # query already complete; nothing to recover
        w.kill()
        self.dead.add(wid)
        for eid in list(self._active_eids[wid]):
            self._cancelled.add(eid)
            self.n_active -= 1
        self._active_eids[wid].clear()
        self.special[wid].clear()
        for cid in self.host[wid]:
            rt = self.channels[cid]
            rt.active = False
            rt.inbox.clear()
        self._push(now + self.cost.detect_delay_s, "detect", {})

    def _apply_detect(self, now: float) -> None:
        # Coordinator raises the GCS barrier: TaskManagers stop starting
        # tasks; in-flight tasks on live workers drain (their commits are
        # atomic, so letting them finish is safe).
        self.paused = True
        self.store.set_recovery_flag(True)
        if self.n_active == 0:
            self._push(now, "recover", {})
        else:
            self.pending_recover = True

    def _apply_recover(self, now: float) -> None:
        if self.n_active > 0:  # a nested failure re-queued us early
            self.pending_recover = True
            return
        self.stats["n_recoveries"] += 1
        live = [w.wid for w in self.workers if w.alive]
        self.store.prune_locations(self.dead)
        self._wm_snap = {
            cid: self.store.watermark(cid) for cid in self.channels
        }
        # Mid-retrace survivors need their outstanding inputs re-planned
        # too (a prior recovery's replay tasks may have died with this
        # worker); the planner treats them as destinations without
        # re-rewinding them.
        extra_dests = frozenset(
            cid
            for cid, rt in self.channels.items()
            if rt.retrace
            and rt.next_seq < rt.retrace
            and self.workers[rt.worker].alive
        )
        rplan = plan_recovery(
            self.store,
            stage_upstreams=self.plan.stage_upstreams(),
            stage_channels={s: self.widths[s] for s in range(len(self.plan.stages))},
            input_stages=self.plan.input_stages(),
            dead_workers=self.dead,
            live_workers=live,
            extra_dests=extra_dests,
            upstream_channels={
                cid: rt.upstream_cids for cid, rt in self.channels.items()
            },
        )
        self.stats["rewound"].append(list(rplan.rewound))

        for cid in rplan.rewound:
            rt = self.channels[cid]
            self._rehome(cid, rplan.new_assignments[cid])
            rt.op = self.plan.stages[cid[0]].make_op()
            rt.next_seq = 0
            rt.retrace = self.store.lineage_len(cid)
            rt.retrace_records = self.store.lineage(cid)
            rt.monolithic = self.cfg.recovery_mode == "data_parallel"
            rt.watermark = {}
            rt.inbox = {}
            rt.flushed = False
            rt.active = False
            rt.done = False
        for cid in rplan.rewound_inputs:
            rt = self.channels[cid]
            self._rehome(cid, rplan.new_assignments[cid])
            # Committed scans are re-run data-parallel (rescans); the
            # channel itself resumes at its next un-scanned batch.
            rt.next_seq = self.store.lineage_len(cid)
            rt.retrace = 0
            rt.retrace_records = []
            rt.active = False
            rt.done = (
                self.store.closed_total(cid) is not None
                and rt.next_seq >= len(rt.scan_batches)
            )
        for r in rplan.rescans:
            self.special[r.worker].append(("rescan", r.name, r.batch_idx))
        for r in rplan.replays:
            if r.owner == DURABLE:
                wid = self.channels[r.dest].worker
            else:
                wid = r.owner
            self.special[wid].append(("replay", r.source, r.dest))
        self.paused = False
        self.store.set_recovery_flag(False)
        self._schedule_pass(now)

    def _rehome(self, cid: ChannelId, new_worker: int) -> None:
        rt = self.channels[cid]
        if cid in self.host[rt.worker]:
            self.host[rt.worker].remove(cid)
        rt.worker = new_worker
        self.host[new_worker].append(cid)
        self.store.set_assignment(cid, new_worker)
