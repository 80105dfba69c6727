"""Resource monitor — psutil substitute over /proc (paper App. B.3.3).

Samples the driver process's RSS every ``interval`` seconds on a daemon
thread and reads CPU time from ``os.times`` (which, in local-mode Spark,
covers the Python side; JVM CPU is approximated by wall × utilization of
the process group via /proc/stat deltas being unavailable per-child, so
we report process-tree RSS and user+system CPU seconds — the same
relative-comparison role as the paper's monitor).
"""
from __future__ import annotations

import os
import threading
import time
from dataclasses import dataclass, field


def _tree_rss_bytes() -> int:
    """RSS of this process plus children (the Spark JVM is a child)."""
    total = 0
    try:
        pids = [os.getpid()] + [
            int(p) for p in os.listdir("/proc") if p.isdigit()
        ]
    except OSError:
        pids = [os.getpid()]
    me = os.getpid()
    for pid in pids:
        try:
            with open(f"/proc/{pid}/stat") as f:
                parts = f.read().split()
            ppid = int(parts[3])
            if pid != me and ppid != me:
                continue
            with open(f"/proc/{pid}/statm") as f:
                rss_pages = int(f.read().split()[1])
            total += rss_pages * os.sysconf("SC_PAGE_SIZE")
        except (OSError, IndexError, ValueError):
            continue
    return total


@dataclass
class ResourceReport:
    wall_seconds: float = 0.0
    cpu_seconds: float = 0.0
    avg_rss_bytes: float = 0.0
    peak_rss_bytes: int = 0
    samples: list[int] = field(default_factory=list)

    @property
    def avg_cpu_utilization(self) -> float:
        """CPU-seconds per wall-second (≈ average busy cores)."""
        return self.cpu_seconds / self.wall_seconds if self.wall_seconds else 0.0


class ResourceMonitor:
    """Context manager: ``with ResourceMonitor() as mon: ...`` then read
    ``mon.report``."""

    def __init__(self, interval: float = 0.25):
        self.interval = interval
        self.report = ResourceReport()
        self._stop = threading.Event()
        self._thread: threading.Thread | None = None

    def _loop(self) -> None:
        while not self._stop.wait(self.interval):
            rss = _tree_rss_bytes()
            self.report.samples.append(rss)
            self.report.peak_rss_bytes = max(self.report.peak_rss_bytes, rss)

    def __enter__(self) -> "ResourceMonitor":
        self._t0 = time.perf_counter()
        t = os.times()
        self._cpu0 = t.user + t.system + t.children_user + t.children_system
        self._stop.clear()
        self._thread = threading.Thread(target=self._loop, daemon=True)
        self._thread.start()
        return self

    def __exit__(self, *exc) -> None:
        self._stop.set()
        if self._thread:
            self._thread.join(timeout=2.0)
        self.report.wall_seconds = time.perf_counter() - self._t0
        t = os.times()
        self.report.cpu_seconds = (
            t.user + t.system + t.children_user + t.children_system - self._cpu0
        )
        if self.report.samples:
            self.report.avg_rss_bytes = sum(self.report.samples) / len(self.report.samples)
