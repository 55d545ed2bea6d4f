"""Processors: the per-vertex computation logic (§3.2 "Jet Processors").

A processor implements the custom logic of a DAG vertex. The tasklet
feeds it one event at a time (from its inbox), collects emitted events
into the outbox, and drives watermark/completion callbacks. Processors
are written against simulated time: the owning tasklet sets ``now_ms``
before every call, which window operators use to stamp trigger times
for the paper's latency clock (§7.1).

State contract for fault tolerance (§4.4): keyed state is exposed via
``save_keyed``/``restore_keyed`` with a class-level ``merge`` so that
partial accumulators from different instances can be merged on restore;
instance-local state (source offsets, sink epochs) via
``save_inst``/``restore_inst``.
"""
from dataclasses import dataclass
from typing import Any, Callable

from .items import WM_MAX, Event


class Processor:
    """Base processor; subclasses override what they need."""

    #: set by the owning tasklet before each run
    now_ms: float = 0.0

    def wanted_ordinal(self) -> int | None:
        """If not None, the tasklet drains only this input ordinal until
        it completes (priority edges — used by hash-join build sides)."""
        return None

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        """Handle one input event; return emitted events."""
        raise NotImplementedError

    def on_watermark(self, wm: int) -> list[Event]:
        """Event-time progress reached ``wm``; flush what is complete."""
        return []

    def on_input_done(self, ordinal: int) -> None:
        """One input channel reached end-of-stream (priority-edge hook)."""

    def complete(self) -> list[Event]:
        """All inputs exhausted; emit any remaining output."""
        return []

    # -- state ----------------------------------------------------------

    def save_keyed(self) -> dict:
        return {}

    def restore_keyed(self, entries: dict) -> None:
        pass

    @staticmethod
    def merge(a, b):
        """Merge two partial keyed-state values (override if stateful)."""
        raise NotImplementedError

    def save_inst(self):
        return None

    def restore_inst(self, state) -> None:
        pass


# --------------------------------------------------------------------------
# Stateless transforms (+ fusion)
# --------------------------------------------------------------------------


class MapProcessor(Processor):
    """Stateless 1→1 transform; ``fn`` returning None drops the event."""

    def __init__(self, fn: Callable[[Any], Any]):
        self.fn = fn

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        out = self.fn(ev.payload)
        return [ev.with_payload(out)] if out is not None else []


class FilterProcessor(Processor):
    """Stateless predicate filter."""

    def __init__(self, pred: Callable[[Any], bool]):
        self.pred = pred

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        return [ev] if self.pred(ev.payload) else []


class FusedProcessor(Processor):
    """Chain of fused stateless stages (operator chaining, §3.1).

    ``stages`` is a list of ``("map", fn)`` / ``("filter", pred)``
    entries applied in order without intermediate queues.
    """

    def __init__(self, stages: list[tuple[str, Callable]]):
        self.stages = stages

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        p = ev.payload
        for kind, fn in self.stages:
            if kind == "map":
                p = fn(p)
                if p is None:
                    return []
            elif kind == "filter":
                if not fn(p):
                    return []
            else:  # pragma: no cover - guarded at pipeline build time
                raise ValueError(kind)
        return [ev.with_payload(p)]


# --------------------------------------------------------------------------
# Aggregate operations (used by both window stages)
# --------------------------------------------------------------------------


@dataclass(frozen=True)
class AggOp:
    """Commutative-associative aggregate: create/add/combine/finish."""

    create: Callable[[], Any]
    add: Callable[[Any, Any], Any]
    combine: Callable[[Any, Any], Any]
    finish: Callable[[Any], Any]


def counting() -> AggOp:
    """COUNT(*) aggregate (Q5's per-auction bid count)."""
    return AggOp(lambda: 0, lambda acc, _p: acc + 1, lambda a, b: a + b, lambda a: a)


def summing(value_fn: Callable[[Any], float]) -> AggOp:
    """SUM(value_fn(payload)) aggregate."""
    return AggOp(
        lambda: 0.0,
        lambda acc, p: acc + value_fn(p),
        lambda a, b: a + b,
        lambda a: a,
    )


def maxing(value_fn: Callable[[Any], float]) -> AggOp:
    """MAX(value_fn(payload)) aggregate (Q7's highest bid)."""
    return AggOp(
        lambda: None,
        lambda acc, p: value_fn(p) if acc is None else max(acc, value_fn(p)),
        lambda a, b: b if a is None else (a if b is None else max(a, b)),
        lambda a: a,
    )


# --------------------------------------------------------------------------
# Two-stage sliding-window aggregation (§3.1: local partial results
# followed by global combining)
# --------------------------------------------------------------------------


@dataclass(frozen=True)
class PaneRecord:
    """A flushed stage-1 partial: one key's accumulator for one pane."""

    key: Any
    pane_start: int
    acc: Any


@dataclass(frozen=True)
class WindowResult:
    """One key's aggregate for one sliding window, stamped with the
    simulated time at which the combiner started emitting it."""

    window_start: int
    window_end: int
    key: Any
    value: Any
    emit_ms: float


class PaneAccumulator(Processor):
    """Stage 1: accumulate events into slide-aligned panes per key.

    Flushes a pane downstream once the watermark passes its end — this
    is the "local partial results" half of Jet's two-stage approach, so
    the data crossing the distributed edge is bounded by
    ``n_keys × panes``, not by the event rate (the Fig 10 effect).
    """

    def __init__(self, key_fn: Callable[[Any], Any], slide_ms: int):
        self.key_fn = key_fn
        self.slide_ms = slide_ms
        self.acc: dict[tuple[Any, int], int] = {}

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        pane = (ev.ts_ms // self.slide_ms) * self.slide_ms
        k = (self.key_fn(ev.payload), pane)
        self.acc[k] = self.acc.get(k, 0) + 1
        return []

    def on_watermark(self, wm: int) -> list[Event]:
        out = []
        for (key, pane), acc in sorted(
            ((k, a) for k, a in self.acc.items() if k[1] + self.slide_ms <= wm),
            key=lambda kv: (kv[0][1], repr(kv[0][0])),
        ):
            out.append(Event(PaneRecord(key, pane, acc), pane + self.slide_ms - 1))
            del self.acc[(key, pane)]
        return out

    def save_keyed(self) -> dict:
        return dict(self.acc)

    def restore_keyed(self, entries: dict) -> None:
        self.acc = dict(entries)

    @staticmethod
    def merge(a, b):
        return a + b


class WindowCombiner(Processor):
    """Stage 2: combine pane partials into sliding-window results.

    Keyed by record key (distributed-partitioned input edge). When the
    watermark passes a window's end, every key with data in that window
    emits a :class:`WindowResult`; ``on_trigger`` (engine-injected)
    records the §7.1 latency sample ``now_ms - window_end``.
    """

    def __init__(
        self,
        size_ms: int,
        slide_ms: int,
        *,
        on_trigger: Callable[[int, float], None] | None = None,
    ):
        assert size_ms % slide_ms == 0
        self.size_ms = size_ms
        self.slide_ms = slide_ms
        self.on_trigger = on_trigger
        self.panes: dict[tuple[Any, int], int] = {}
        #: max window end already emitted — guards against re-emission
        #: across watermark advances and across snapshot restore
        self.emitted_upto = -1

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        r: PaneRecord = ev.payload
        k = (r.key, r.pane_start)
        cur = self.panes.get(k)
        self.panes[k] = r.acc if cur is None else cur + r.acc
        return []

    def on_watermark(self, wm: int) -> list[Event]:
        # windows [s, s+size) with s+size <= wm are complete; a pane at p
        # participates in every window ending at p+slide .. p+size
        out = []
        n = self.size_ms // self.slide_ms
        complete_ends = sorted(
            {
                p + i * self.slide_ms
                for (_k, p) in self.panes
                for i in range(1, n + 1)
                if self.emitted_upto < p + i * self.slide_ms <= wm
            }
        )
        for end in complete_ends:
            start = end - self.size_ms
            per_key: dict[Any, int] = {}
            for (key, pane), acc in self.panes.items():
                if start <= pane < end:
                    per_key[key] = per_key.get(key, 0) + acc
            # a WM_MAX flush is an end-of-stream drain, not a §7.1
            # latency-clock trigger (those windows never close in an
            # unbounded stream)
            if self.on_trigger is not None and per_key and wm < WM_MAX:
                self.on_trigger(end, self.now_ms)
            for key in sorted(per_key, key=repr):
                out.append(
                    Event(
                        WindowResult(start, end, key, per_key[key], self.now_ms),
                        end - 1,
                    )
                )
        self.emitted_upto = max(self.emitted_upto, wm)
        # a pane p is dead once its last containing window ([p, p+size))
        # has been emitted
        for k in [k for k in self.panes if k[1] + self.size_ms <= self.emitted_upto]:
            del self.panes[k]
        return out

    def save_keyed(self) -> dict:
        return dict(self.panes)

    def restore_keyed(self, entries: dict) -> None:
        self.panes = dict(entries)

    @staticmethod
    def merge(a, b):
        return a + b

    def save_inst(self):
        return self.emitted_upto

    def restore_inst(self, state) -> None:
        if state is not None:
            self.emitted_upto = state


class WindowTop(Processor):
    """Stage 3 (Q5's "hot items"): per window, keep the keys with the
    maximum value. Global single instance; input is complete for a
    window once the watermark passes its end."""

    def __init__(self, size_ms: int):
        self.size_ms = size_ms
        self.by_window: dict[int, dict[Any, int]] = {}

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        r: WindowResult = ev.payload
        self.by_window.setdefault(r.window_start, {})[r.key] = r.value
        return []

    def on_watermark(self, wm: int) -> list[Event]:
        out = []
        for start in sorted(s for s in self.by_window if s + self.size_ms <= wm):
            per_key = self.by_window.pop(start)
            best = max(per_key.values())
            for key in sorted((k for k, v in per_key.items() if v == best), key=repr):
                out.append(
                    Event(
                        {"window_start": start, "auction": key, "n_bids": best},
                        start + self.size_ms - 1,
                    )
                )
        return out

    def save_keyed(self) -> dict:
        return {s: dict(m) for s, m in self.by_window.items()}

    def restore_keyed(self, entries: dict) -> None:
        self.by_window = {s: dict(m) for s, m in entries.items()}

    @staticmethod
    def merge(a, b):
        out = dict(a)
        out.update(b)
        return out


# --------------------------------------------------------------------------
# Joins
# --------------------------------------------------------------------------


class TumblingJoin(Processor):
    """Q8-style windowed stream-stream join on a shared key.

    Ordinal 0 carries "left" events (persons), ordinal 1 "right"
    (auctions). Keyed state per ``(key, window_start)`` remembers which
    sides were seen; a match is emitted once the window closes.
    """

    def __init__(
        self,
        size_ms: int,
        left_key: Callable[[Any], Any],
        right_key: Callable[[Any], Any],
        emit: Callable[[Any, int], Any],
        *,
        on_trigger: Callable[[int, float], None] | None = None,
    ):
        self.size_ms = size_ms
        self.left_key = left_key
        self.right_key = right_key
        self.emit = emit
        self.on_trigger = on_trigger
        # (key, win) -> [left_payload | None, right_seen bool]
        self.state: dict[tuple[Any, int], list] = {}

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        key = self.left_key(ev.payload) if ordinal == 0 else self.right_key(ev.payload)
        win = (ev.ts_ms // self.size_ms) * self.size_ms
        st = self.state.setdefault((key, win), [None, False])
        if ordinal == 0:
            st[0] = ev.payload
        else:
            st[1] = True
        return []

    def on_watermark(self, wm: int) -> list[Event]:
        out = []
        ready = sorted(
            (k for k in self.state if k[1] + self.size_ms <= wm),
            key=lambda k: (k[1], repr(k[0])),
        )
        triggered: set[int] = set()
        for key, win in ready:
            left, right = self.state.pop((key, win))
            if left is not None and right:
                if self.on_trigger is not None and win not in triggered and wm < WM_MAX:
                    self.on_trigger(win + self.size_ms, self.now_ms)
                    triggered.add(win)
                out.append(Event(self.emit(left, win), win + self.size_ms - 1))
        return out

    def save_keyed(self) -> dict:
        return {k: list(v) for k, v in self.state.items()}

    def restore_keyed(self, entries: dict) -> None:
        self.state = {k: list(v) for k, v in entries.items()}

    @staticmethod
    def merge(a, b):
        return [a[0] if a[0] is not None else b[0], a[1] or b[1]]


class HashJoin(Processor):
    """Batch/stream hash join (§2.1's hybrid pipeline; Q13).

    Ordinal 0 is the finite build side — consumed entirely first via
    ``wanted_ordinal`` (a priority edge). Ordinal 1 then probes the
    hash table per event.
    """

    def __init__(
        self,
        build_key: Callable[[Any], Any],
        probe_key: Callable[[Any], Any],
        merge_fn: Callable[[Any, Any], Any],
    ):
        self.build_key = build_key
        self.probe_key = probe_key
        self.merge_fn = merge_fn
        self.table: dict[Any, Any] = {}
        self.built = False

    def wanted_ordinal(self) -> int | None:
        return None if self.built else 0

    def on_input_done(self, ordinal: int) -> None:
        if ordinal == 0:
            self.built = True

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        if ordinal == 0:
            self.table[self.build_key(ev.payload)] = ev.payload
            return []
        match = self.table.get(self.probe_key(ev.payload))
        return [ev.with_payload(self.merge_fn(ev.payload, match))] if match is not None else []

    def save_keyed(self) -> dict:
        return dict(self.table)

    def restore_keyed(self, entries: dict) -> None:
        self.table = dict(entries)
        self.built = bool(entries)

    @staticmethod
    def merge(a, b):
        return a if a is not None else b


# --------------------------------------------------------------------------
# Sinks
# --------------------------------------------------------------------------


class SinkProcessor(Processor):
    """Terminal vertex recording results and per-event latencies.

    ``transactional=False``: every event goes straight to ``external``
    (at-least-once delivery under replay).
    ``transactional=True``: events buffer in the current epoch; the
    engine calls :meth:`prepare_epoch` at each barrier and commits the
    prepared buffer only once the snapshot completes (two-phase commit,
    §4.5), with ``(snapshot, instance)`` dedup on the external side.
    """

    def __init__(self, inst_idx: int, external: "ExternalStore", *, transactional: bool):
        self.inst_idx = inst_idx
        self.external = external
        self.transactional = transactional
        self.epoch: list = []
        self.latencies: list[float] = []

    def process(self, ev: Event, ordinal: int) -> list[Event]:
        self.latencies.append(self.now_ms - ev.ts_ms)
        if self.transactional:
            self.epoch.append(ev.payload)
        else:
            self.external.emit(ev.payload)
        return []

    def prepare_epoch(self, sid: int) -> list:
        """Phase 1 of 2PC: seal the epoch buffer for snapshot ``sid``."""
        out, self.epoch = self.epoch, []
        return out

    def complete(self) -> list[Event]:
        # normal job completion commits the trailing epoch directly
        if self.transactional and self.epoch:
            self.external.commit(("__final__", self.inst_idx), self.epoch)
            self.epoch = []
        return []

    def save_inst(self):
        return list(self.epoch)

    def restore_inst(self, state) -> None:
        self.epoch = list(state or [])


class ExternalStore:
    """The world outside the job: an acknowledging downstream system.

    ``emit`` appends immediately (non-transactional path); ``commit``
    applies a prepared buffer exactly once per ``(sid, instance)`` token
    — re-commits after recovery are deduplicated, giving end-to-end
    exactly-once when paired with the transactional sink.
    """

    def __init__(self):
        self.rows: list = []
        self._committed: set = set()

    def emit(self, payload) -> None:
        self.rows.append(payload)

    def commit(self, token, payloads: list) -> None:
        if token in self._committed:
            return
        self._committed.add(token)
        self.rows.extend(payloads)
