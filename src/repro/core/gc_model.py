"""Garbage-collection interference model (§5 "Garbage collection").

The paper's deployment runs G1 with a 5 ms pause target and leaves CPU
headroom so GC runs concurrently; the contrast case (which the paper
calls out as "one of the hidden performance enemies of stream
processing") is a collector that stops the world for tens to hundreds
of milliseconds. We model both as a deterministic, seeded schedule of
(start, duration) pauses per node; while a pause is active the node's
cooperative threads do not run.

``G1_TUNED`` reproduces the paper's configuration (frequent, bounded,
small pauses); ``STW_BASELINE`` models an untuned collector and is used
by the scheduler-baseline experiment to show where "seconds at p99"
latencies come from in existing systems.
"""
from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class GcConfig:
    """A pause-generating profile.

    ``interval_ms`` is the mean time between pauses; ``pause_ms`` the
    mean pause duration, truncated to ``pause_cap_ms`` (G1's pause
    target acts as a cap, not a mean).
    """

    name: str
    interval_ms: float
    pause_ms: float
    pause_jitter_ms: float
    pause_cap_ms: float


#: Paper §7.1: G1, "GC pause target of at most 5 milliseconds", mostly
#: concurrent — young-gen pauses stay in the low single-digit ms. The
#: 5 ms target is soft; occasional pauses overshoot (cap 9 ms).
G1_TUNED = GcConfig("g1-tuned", interval_ms=800.0, pause_ms=2.5, pause_jitter_ms=2.0, pause_cap_ms=9.0)

#: An untuned stop-the-world profile (the "existing systems" failure
#: mode): rarer but much longer pauses.
STW_BASELINE = GcConfig(
    "stw-baseline", interval_ms=2_000.0, pause_ms=120.0, pause_jitter_ms=80.0, pause_cap_ms=600.0
)


def pause_schedule(
    horizon_ms: float, cfg: GcConfig, *, seed: int
) -> list[tuple[float, float]]:
    """Deterministic sorted (start, duration) pauses covering the horizon."""
    rng = np.random.default_rng(seed)
    out: list[tuple[float, float]] = []
    t = float(rng.exponential(cfg.interval_ms))
    while t < horizon_ms:
        dur = min(
            max(0.2, float(rng.normal(cfg.pause_ms, cfg.pause_jitter_ms))),
            cfg.pause_cap_ms,
        )
        out.append((t, dur))
        t += dur + float(rng.exponential(cfg.interval_ms))
    return out


class PauseTracker:
    """O(1) amortized "is this node paused at time t" over a schedule."""

    def __init__(self, schedule: list[tuple[float, float]]):
        self.schedule = schedule
        self._i = 0

    def in_pause(self, now_ms: float) -> bool:
        while self._i < len(self.schedule) and self.schedule[self._i][0] + self.schedule[self._i][1] <= now_ms:
            self._i += 1
        if self._i >= len(self.schedule):
            return False
        start, dur = self.schedule[self._i]
        return start <= now_ms < start + dur
