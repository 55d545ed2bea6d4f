"""Bounded single-producer single-consumer queues.

Tasklets on the same node exchange data through bounded SPSC queues
(§3.2): one queue instance per producer/consumer tasklet pair. In Jet
these are wait-free ring buffers; under the simulator's cooperative
scheduling there is no real concurrency, so a deque with a capacity
check reproduces the *behavioural* contract that matters for the
experiments: ``offer`` fails when full (local backpressure, §3.3) and
``poll``/``drain`` never block.

:class:`NetworkChannel` decorates a queue with link latency and
credit-based flow control, modelling the distributed-edge receive
window of §3.3 (ack every 100 ms, ~300 ms worth of credits).
"""
from collections import deque

#: Jet's default edge queue capacity (1024 items per SPSC queue).
DEFAULT_CAPACITY = 1024


class SPSCQueue:
    """Bounded FIFO with non-blocking offer/poll."""

    __slots__ = ("capacity", "_q")

    def __init__(self, capacity: int = DEFAULT_CAPACITY):
        self.capacity = capacity
        self._q: deque = deque()

    def offer(self, item) -> bool:
        """Enqueue unless full; returns False (producer backs off) when full."""
        if len(self._q) >= self.capacity:
            return False
        self._q.append(item)
        return True

    def poll(self):
        """Dequeue one item, or None when empty."""
        return self._q.popleft() if self._q else None

    def peek(self):
        return self._q[0] if self._q else None

    def drain(self, max_items: int) -> list:
        """Dequeue up to ``max_items`` items (consumer-side batching)."""
        out = []
        while self._q and len(out) < max_items:
            out.append(self._q.popleft())
        return out

    def __len__(self) -> int:
        return len(self._q)

    @property
    def remaining(self) -> int:
        return self.capacity - len(self._q)


class NetworkChannel:
    """A distributed-edge channel: latency + credit flow control.

    The producer spends one *credit* per item; the consumer re-grants
    credits every ``ack_interval_ms`` sized to ``window_ms`` worth of
    its observed consumption rate (§3.3: "in stable state the
    receive_window contains roughly 300 milliseconds' worth of data").
    Items become visible to the consumer ``latency_ms`` after send.
    """

    def __init__(
        self,
        *,
        latency_ms: float = 0.5,
        ack_interval_ms: float = 100.0,
        window_ms: float = 300.0,
        initial_credits: int = 4096,
        capacity: int = 1 << 20,
    ):
        self.latency_ms = latency_ms
        self.ack_interval_ms = ack_interval_ms
        self.window_ms = window_ms
        self.credits = initial_credits
        self.initial_credits = initial_credits
        self._in_flight: deque = deque()  # (available_at_ms, item)
        self._ready: deque = deque()
        self.capacity = capacity
        self._last_ack_ms = 0.0
        self._consumed_since_ack = 0
        self.sent = 0
        self.received = 0

    def offer(self, item, now_ms: float) -> bool:
        """Send one item if a credit is available."""
        if self.credits <= 0 or len(self._in_flight) + len(self._ready) >= self.capacity:
            return False
        self.credits -= 1
        self._in_flight.append((now_ms + self.latency_ms, item))
        self.sent += 1
        return True

    def _promote(self, now_ms: float) -> None:
        while self._in_flight and self._in_flight[0][0] <= now_ms:
            self._ready.append(self._in_flight.popleft()[1])

    def poll(self, now_ms: float):
        """Receive one delivered item, or None."""
        self._promote(now_ms)
        if not self._ready:
            return None
        self._consumed_since_ack += 1
        self.received += 1
        return self._ready.popleft()

    def peek(self, now_ms: float):
        self._promote(now_ms)
        return self._ready[0] if self._ready else None

    def maybe_ack(self, now_ms: float) -> None:
        """Consumer-side credit grant, every ``ack_interval_ms``.

        The new window is the consumption observed since the last ack
        scaled to ``window_ms`` (adaptive sizing), never below a floor
        so a stalled flow can restart.
        """
        if now_ms - self._last_ack_ms < self.ack_interval_ms:
            return
        elapsed = max(now_ms - self._last_ack_ms, 1e-9)
        rate_per_ms = self._consumed_since_ack / elapsed
        window = max(int(rate_per_ms * self.window_ms), 64)
        backlog = len(self._in_flight) + len(self._ready)
        self.credits = max(self.credits, window - backlog)
        self._last_ack_ms = now_ms
        self._consumed_since_ack = 0

    def __len__(self) -> int:
        return len(self._in_flight) + len(self._ready)
