"""Exact-mode execution engine: a Jet cluster in simulated time.

Deploys a Core DAG across ``n_nodes × threads_per_node`` cooperative
threads exactly as §3.1 describes — the *complete* dataflow graph on
every core — and advances a simulated clock in small scheduler slices.
Within a slice each worker thread executes its tasklets round-robin
(§3.2, Figure 4), charging each run's simulated cost against the slice
budget. Events are real: processors compute real query results, which
the tests compare against Spark and DuckDB.

Fault tolerance follows §4.4: a coordinator periodically instructs
source tasklets to snapshot; aligned barriers flow through the DAG;
every tasklet writes its state into IMDG IMaps (replicated, §2.4); a
snapshot completes when all tasklets have acked. ``fail_node`` kills a
member mid-run — the IMDG promotes backups, a fresh member joins, the
job restarts from the last completed snapshot, sources replay from
their recorded offsets, and transactional sinks dedup re-commits,
yielding end-to-end exactly-once output.
"""
from collections import Counter
from dataclasses import dataclass, field

from ..imdg.cluster import Cluster
from ..imdg.imap import IMap
from ..imdg.partition import partition_id
from .dag import DAG
from .gc_model import GcConfig, PauseTracker, pause_schedule
from .processors import ExternalStore, SinkProcessor
from .queues import NetworkChannel, SPSCQueue
from .source import SourceTasklet
from .tasklet import InboundChannel, OutboundEdge, Tasklet


@dataclass
class SimConfig:
    """Engine knobs; defaults mirror the paper's deployment (§7.1)."""

    threads_per_node: int = 2
    slice_ms: float = 0.5
    queue_capacity: int = 1024
    net_latency_ms: float = 0.5
    ack_interval_ms: float = 100.0
    receive_window_ms: float = 300.0
    cost_per_item_ms: float = 0.0005
    run_overhead_ms: float = 0.0005
    inbox_limit: int = 256
    source_batch: int = 256
    guarantee: str = "none"  # none | at-least-once | exactly-once
    snapshot_interval_ms: float | None = None
    backup_count: int = 1
    gc: GcConfig | None = None
    max_sim_ms: float = 600_000.0
    seed: int = 1


@dataclass
class Metrics:
    """Run metrics: §7.1 latency clock samples and throughput counters."""

    trigger_latencies: list[tuple[int, float]] = field(default_factory=list)
    event_latencies: list[float] = field(default_factory=list)
    items: Counter = field(default_factory=Counter)
    snapshots_completed: int = 0
    recoveries: int = 0

    def add_items(self, name: str, n: int) -> None:
        self.items[name] += n


class _JobCtx:
    """Context handed to vertex processor factories."""

    def __init__(self, engine: "JetEngine"):
        self._e = engine
        self.external = engine.external

    @property
    def transactional(self) -> bool:
        return (
            self._e.cfg.guarantee == "exactly-once"
            and self._e.cfg.snapshot_interval_ms is not None
        )

    def record_trigger(self, window_end: int, now_ms: float) -> None:
        self._e.metrics.trigger_latencies.append((window_end, now_ms - window_end))


class Worker:
    """One cooperative thread: a round-robin loop over its tasklets."""

    def __init__(self, slice_ms: float):
        self.tasklets: list = []
        self.slice_ms = slice_ms

    def run_slice(self, now_ms: float) -> None:
        budget = self.slice_ms
        while budget > 0:
            progressed = False
            for t in self.tasklets:
                p, cost = t.run(now_ms + (self.slice_ms - budget))
                budget -= cost
                progressed = progressed or p
                if budget <= 0:
                    break
            if not progressed:
                break


class JetEngine:
    """A job deployed on a simulated Jet cluster backed by the IMDG."""

    def __init__(
        self,
        dag: DAG,
        sources: dict[str, list[tuple[int, int, object]]],
        *,
        n_nodes: int,
        cfg: SimConfig | None = None,
    ):
        dag.validate()
        self.dag = dag
        self.cfg = cfg or SimConfig()
        self.n_nodes = n_nodes
        self.T = self.cfg.threads_per_node
        self.cluster = Cluster(n_nodes, backup_count=self.cfg.backup_count)
        self.node_members = list(self.cluster.member_ids)
        self.external = ExternalStore()
        self.metrics = Metrics()
        self.ctx = _JobCtx(self)
        self._imaps: dict[str, IMap] = {}
        # split each stream round-robin over its source instances once;
        # the split is reused verbatim on recovery so replay is exact
        n_inst = n_nodes * self.T
        missing = [s.stream for s in dag.sources.values() if s.stream not in sources]
        if missing:
            raise ValueError(f"no data for streams {missing}")
        self._source_split = {
            name: [sources[sv.stream][k::n_inst] for k in range(n_inst)]
            for name, sv in dag.sources.items()
        }
        self.t0 = float(
            min(
                (ev[0] for evs in sources.values() for ev in evs[:1]),
                default=0,
            )
        )
        self.now = self.t0
        # snapshot coordinator state
        self.next_sid = 1
        self.inflight_sid: int | None = None
        self._acks: set[tuple[str, int]] = set()
        self.last_complete_sid: int | None = None
        self._last_snap_ms = self.t0
        self._build()

    # -- topology helpers ----------------------------------------------

    def _n_inst(self, vname: str) -> int:
        if vname in self.dag.sources:
            return self.n_nodes * self.T
        return self.n_nodes * self.T if self.dag.vertices[vname].parallelism == "per_core" else 1

    def _loc(self, vname: str, k: int) -> tuple[int, int]:
        """(node_idx, thread_idx) of instance k."""
        if self._n_inst(vname) == 1:
            return 0, 0
        return k // self.T, k % self.T

    def _route_key(self, key, n_inst: int) -> int:
        """Partitioned-edge routing aligned with the IMDG table (§4.1)."""
        if n_inst == 1:
            return 0
        pid = partition_id(key, self.cluster.n_partitions)
        member = self.cluster.table.primary(pid)
        node_idx = self.node_members.index(member)
        return node_idx * self.T + pid % self.T

    def _imap(self, name: str) -> IMap:
        if name not in self._imaps:
            self._imaps[name] = IMap(name, self.cluster)
        return self._imaps[name]

    # -- build ----------------------------------------------------------

    def _build(self) -> None:
        """(Re)build tasklets, queues and workers for current membership."""
        cfg = self.cfg
        self.workers = [Worker(cfg.slice_ms) for _ in range(self.n_nodes * self.T)]
        self.source_tasklets: dict[tuple[str, int], SourceTasklet] = {}
        self.tasklets: dict[tuple[str, int], Tasklet] = {}
        self.procs: dict[tuple[str, int], object] = {}
        inbound: dict[tuple[str, int], list[InboundChannel]] = {
            (v, k): [] for v in self.dag.vertices for k in range(self._n_inst(v))
        }

        def mk_queue(src_loc, dst_loc):
            if src_loc[0] == dst_loc[0]:
                return SPSCQueue(cfg.queue_capacity), False
            return (
                NetworkChannel(
                    latency_ms=cfg.net_latency_ms,
                    ack_interval_ms=cfg.ack_interval_ms,
                    window_ms=cfg.receive_window_ms,
                ),
                True,
            )

        out_edges: dict[tuple[str, int], list[OutboundEdge]] = {}
        for vname in list(self.dag.sources) + list(self.dag.vertices):
            for e in self.dag.out_edges(vname):
                n_src, n_dst = self._n_inst(e.src), self._n_inst(e.dst)
                for k in range(n_src):
                    src_loc = self._loc(e.src, k)
                    if e.routing == "one_to_one":
                        targets = [k % n_dst]
                    elif e.routing == "to_one":
                        targets = [0]
                    else:  # partitioned
                        targets = list(range(n_dst))
                    queues = []
                    for ti, t in enumerate(targets):
                        q, remote = mk_queue(src_loc, self._loc(e.dst, t))
                        queues.append(q)
                        inbound[(e.dst, t)].append(
                            InboundChannel(q, remote=remote, ordinal=e.ordinal)
                        )
                    if e.routing == "partitioned":
                        kf = e.key_fn
                        route = lambda p, kf=kf, nd=n_dst: self._route_key(kf(p), nd)
                    else:
                        route = None
                    out_edges.setdefault((e.src, k), []).append(
                        OutboundEdge(queues, route, name=f"{e.src}->{e.dst}")
                    )

        # source tasklets
        for sname, sv in self.dag.sources.items():
            for k in range(self._n_inst(sname)):
                st = SourceTasklet(
                    f"{sname}#{k}",
                    self._source_split[sname][k],
                    out_edges.get((sname, k), []),
                    ooo_lag_ms=sv.ooo_lag_ms,
                    batch=cfg.source_batch,
                    cost_per_item_ms=cfg.cost_per_item_ms / 2,
                    run_overhead_ms=cfg.run_overhead_ms,
                    on_snapshot=self._mk_source_snapshot_cb(sname, k),
                )
                self.source_tasklets[(sname, k)] = st
                ni, ti = self._loc(sname, k)
                self.workers[ni * self.T + ti].tasklets.append(st)

        # processor tasklets
        for vname, v in self.dag.vertices.items():
            for k in range(self._n_inst(vname)):
                proc = v.make(self.ctx, k)
                self.procs[(vname, k)] = proc
                chans = inbound[(vname, k)]
                chans.sort(key=lambda c: c.ordinal)
                t = Tasklet(
                    f"{vname}#{k}",
                    proc,
                    chans,
                    out_edges.get((vname, k), []),
                    exactly_once=cfg.guarantee == "exactly-once",
                    inbox_limit=cfg.inbox_limit,
                    cost_per_item_ms=cfg.cost_per_item_ms,
                    run_overhead_ms=cfg.run_overhead_ms,
                    on_snapshot=self._mk_snapshot_cb(vname, k),
                    metrics=self.metrics,
                )
                self.tasklets[(vname, k)] = t
                ni, ti = self._loc(vname, k)
                self.workers[ni * self.T + ti].tasklets.append(t)

        # GC pause schedules, one per node
        if cfg.gc is not None:
            self._pauses = [
                PauseTracker(
                    pause_schedule(cfg.max_sim_ms, cfg.gc, seed=cfg.seed * 1000 + n)
                )
                for n in range(self.n_nodes)
            ]
        else:
            self._pauses = None

    # -- snapshots (§4.4) ----------------------------------------------

    def _snap_map(self, sid: int, vname: str) -> IMap:
        return self._imap(f"__snap.{sid}.{vname}")

    def _inst_map(self, sid: int) -> IMap:
        return self._imap(f"__snap.{sid}.__inst")

    def _meta_map(self) -> IMap:
        return self._imap("__snap.meta")

    def _mk_source_snapshot_cb(self, sname: str, k: int):
        def cb(sid: int, src: SourceTasklet) -> None:
            self._inst_map(sid).put((sname, k), src.save_inst())
            self._ack(sid, sname, k)

        return cb

    def _mk_snapshot_cb(self, vname: str, k: int):
        def cb(sid: int, tasklet: Tasklet) -> None:
            proc = tasklet.processor
            if isinstance(proc, SinkProcessor):
                self._inst_map(sid).put((vname, k), proc.prepare_epoch(sid))
            else:
                snap = self._snap_map(sid, vname)
                for key, val in proc.save_keyed().items():
                    snap.put((k, key), val)
                self._inst_map(sid).put((vname, k), proc.save_inst())
            self._ack(sid, vname, k)

        return cb

    def _expected_acks(self) -> int:
        return sum(self._n_inst(v) for v in self.dag.sources) + sum(
            self._n_inst(v) for v in self.dag.vertices
        )

    def _ack(self, sid: int, vname: str, k: int) -> None:
        if sid != self.inflight_sid:
            return  # stale ack from a cancelled snapshot
        self._acks.add((vname, k))
        if len(self._acks) == self._expected_acks():
            self._meta_map().put(sid, True)
            self.last_complete_sid = sid
            self.inflight_sid = None
            self.metrics.snapshots_completed += 1
            self._commit_sinks(sid)

    def _commit_sinks(self, sid: int) -> None:
        """Phase 2 of 2PC: release prepared sink epochs (§4.5)."""
        im = self._inst_map(sid)
        for vname, v in self.dag.vertices.items():
            if not v.is_sink:
                continue
            for k in range(self._n_inst(vname)):
                items = im.get((vname, k))
                if items:
                    self.external.commit((sid, vname, k), items)

    def _maybe_trigger_snapshot(self) -> None:
        cfg = self.cfg
        if cfg.snapshot_interval_ms is None or cfg.guarantee == "none":
            return
        if self.inflight_sid is not None:
            return
        if self.now - self._last_snap_ms < cfg.snapshot_interval_ms:
            return
        if all(s.done or s._finishing for s in self.source_tasklets.values()):
            return  # job draining; no further snapshots
        if any(
            p.wanted_ordinal() is not None
            for p in self.procs.values()
        ):
            # a hash-join build (priority edge) is still in progress:
            # like Jet, defer snapshots until priority edges are drained
            # (a barrier on a priority input would deadlock alignment)
            return
        sid = self.next_sid
        self.next_sid += 1
        self.inflight_sid = sid
        self._acks = set()
        self._last_snap_ms = self.now
        for (sname, k), st in self.source_tasklets.items():
            if st.done or st._finishing:
                # a completed (bounded) source cannot emit a barrier; its
                # consumers drain its channels to EOS before their own
                # alignment completes, so acking its final offset now is
                # exact — nothing of it is in flight past the barrier
                self._inst_map(sid).put((sname, k), st.save_inst())
                self._ack(sid, sname, k)
            else:
                st.pending_snapshot_sid = sid

    # -- failure & recovery (§4.4, Fig 6) -------------------------------

    def fail_node(self, node_idx: int) -> None:
        """Crash a member and run the full recovery protocol."""
        member = self.node_members[node_idx]
        self.cluster.fail_node(member)
        self.node_members[node_idx] = self.cluster.add_node()
        self.metrics.recoveries += 1
        self.inflight_sid = None
        self._acks = set()
        self._build()
        sid = self.last_complete_sid
        if sid is None:
            self._last_snap_ms = self.now
            return  # cold restart from offset 0 with empty state
        # keyed state: merge partials per record key, re-route by the
        # current partition table, restore per instance
        for vname, v in self.dag.vertices.items():
            if v.merge is None:
                continue
            merged: dict = {}
            for (_inst, key), val in self._snap_map(sid, vname).entry_set():
                merged[key] = v.merge(merged[key], val) if key in merged else val
            n_inst = self._n_inst(vname)
            in_part = [e for e in self.dag.in_edges(vname) if e.routing == "partitioned"]
            per_inst: dict[int, dict] = {}
            for key, val in merged.items():
                rk = v.state_record_key(key)
                inst = self._route_key(rk, n_inst) if in_part else hash(repr(rk)) % n_inst
                per_inst.setdefault(inst, {})[key] = val
            for inst, entries in per_inst.items():
                self.procs[(vname, inst)].restore_keyed(entries)
        # instance state: source offsets, combiner emit cursors, sink epochs
        im = self._inst_map(sid)
        for (vname, k), st in im.entry_set():
            if (vname, k) in self.source_tasklets:
                self.source_tasklets[(vname, k)].restore_inst(st)
            elif (vname, k) in self.procs:
                proc = self.procs[(vname, k)]
                if isinstance(proc, SinkProcessor):
                    proc.restore_inst(None)  # prepared epoch is committed below
                else:
                    proc.restore_inst(st)
        self._commit_sinks(sid)  # idempotent re-commit after recovery
        self._last_snap_ms = self.now

    # -- main loop ------------------------------------------------------

    def _done(self) -> bool:
        return all(
            self.tasklets[(vname, k)].done
            for vname, v in self.dag.vertices.items()
            if v.is_sink
            for k in range(self._n_inst(vname))
        )

    def run(self, *, fail_at: list[tuple[float, int]] | None = None) -> Metrics:
        """Advance simulated time until every sink completed.

        ``fail_at`` is a list of ``(sim_time_ms, node_idx)`` crash
        injections, applied once each.
        """
        schedule = sorted(fail_at or [])
        cfg = self.cfg
        while not self._done():
            while schedule and self.now >= self.t0 + schedule[0][0]:
                self.fail_node(schedule.pop(0)[1])
            self._maybe_trigger_snapshot()
            for w_idx, worker in enumerate(self.workers):
                if self._pauses is not None and self._pauses[w_idx // self.T].in_pause(
                    self.now
                ):
                    continue
                worker.run_slice(self.now)
            self.now += cfg.slice_ms
            if self.now - self.t0 > cfg.max_sim_ms:
                raise RuntimeError("simulation horizon exceeded — livelock?")
        # fold sink event latencies into metrics
        for (vname, k), proc in self.procs.items():
            if isinstance(proc, SinkProcessor):
                self.metrics.event_latencies.extend(proc.latencies)
        return self.metrics

    def results(self) -> list:
        """Externally visible output rows (committed, for transactional)."""
        return list(self.external.rows)
