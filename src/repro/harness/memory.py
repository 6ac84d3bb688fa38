"""Peak-RAM measurement (paper Table 7).

The paper samples /proc at 1-second intervals during workload execution
and reports the peak. Here the "system" is this Python driver plus its
child processes (the Spark driver JVM and Python workers), so we walk the
process tree under /proc and sum resident set sizes, sampling on a
background thread.
"""
from __future__ import annotations

import os
import threading
import time


def _children_of(pids: set[int]) -> set[int]:
    out = set()
    for entry in os.listdir("/proc"):
        if not entry.isdigit():
            continue
        try:
            with open(f"/proc/{entry}/stat") as f:
                fields = f.read().split()
            ppid = int(fields[3])
            if ppid in pids:
                out.add(int(entry))
        except (OSError, IndexError, ValueError):
            continue
    return out


def process_tree_rss_bytes(root_pid: int | None = None) -> int:
    """Total VmRSS of root_pid (default: this process) and descendants."""
    root = root_pid or os.getpid()
    pids = {root}
    while True:
        more = _children_of(pids) - pids
        if not more:
            break
        pids |= more
    total = 0
    for pid in pids:
        try:
            with open(f"/proc/{pid}/status") as f:
                for line in f:
                    if line.startswith("VmRSS:"):
                        total += int(line.split()[1]) * 1024
                        break
        except OSError:
            continue
    return total


def total_system_memory_bytes() -> int:
    with open("/proc/meminfo") as f:
        for line in f:
            if line.startswith("MemTotal:"):
                return int(line.split()[1]) * 1024
    raise RuntimeError("MemTotal not found")


class PeakRssSampler:
    """Background sampler: peak process-tree RSS during a workload.

    Usage::

        with PeakRssSampler(interval=1.0) as s:
            run_workload()
        print(s.peak_bytes, s.peak_fraction)
    """

    def __init__(self, interval: float = 1.0):
        self.interval = interval
        self.peak_bytes = 0
        self._stop = threading.Event()
        self._thread: threading.Thread | None = None

    def _loop(self) -> None:
        while not self._stop.is_set():
            self.peak_bytes = max(self.peak_bytes, process_tree_rss_bytes())
            self._stop.wait(self.interval)

    def __enter__(self) -> "PeakRssSampler":
        self.peak_bytes = process_tree_rss_bytes()
        self._thread = threading.Thread(target=self._loop, daemon=True)
        self._thread.start()
        return self

    def __exit__(self, *exc) -> None:
        self._stop.set()
        if self._thread:
            self._thread.join(timeout=5)
        self.peak_bytes = max(self.peak_bytes, process_tree_rss_bytes())

    @property
    def peak_fraction(self) -> float:
        """Peak as a fraction of machine memory (the paper's % format)."""
        return self.peak_bytes / total_system_memory_bytes()
