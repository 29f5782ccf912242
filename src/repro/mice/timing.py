"""Phase timing for the MICE benchmarks (preprocess vs per-iteration cost)."""
from __future__ import annotations

import time
from collections import defaultdict
from contextlib import contextmanager


class TimingLog:
    """Accumulates wall-clock seconds per named phase.

    Phase names use dotted buckets, e.g. ``preprocess.partition`` or
    ``iter.cofactor``; ``bucket("iter")`` sums every phase under a prefix.
    """

    def __init__(self) -> None:
        self.phases: dict[str, float] = defaultdict(float)

    @contextmanager
    def time(self, name: str):
        t0 = time.perf_counter()
        try:
            yield
        finally:
            self.phases[name] += time.perf_counter() - t0

    def add(self, name: str, secs: float) -> None:
        self.phases[name] += secs

    def bucket(self, prefix: str) -> float:
        return sum(v for k, v in self.phases.items() if k.startswith(prefix))

    def total(self) -> float:
        return sum(self.phases.values())

    def as_dict(self) -> dict[str, float]:
        return dict(self.phases)
