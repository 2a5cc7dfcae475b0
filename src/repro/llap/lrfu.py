"""LRFU (Least Recently/Frequently Used) replacement policy (§5.1).

LLAP's default eviction policy, "tuned for analytic workloads with frequent
full and partial scans". LRFU generalizes LRU and LFU: every past access to
a block contributes ``(1/2)^(λ·age)`` to its *combined recency-frequency*
(CRF) value, maintained incrementally as

    crf(t_access) = 1 + crf(t_prev) · 2^(−λ·(t_access − t_prev))

λ → 0 degenerates to LFU (all history counts equally), λ → 1 to LRU (only
the last access matters). Time is a logical access counter.
"""
from __future__ import annotations

from dataclasses import dataclass

__all__ = ["LRFUPolicy"]


@dataclass
class _Entry:
    crf: float
    last_access: int


class LRFUPolicy:
    def __init__(self, lam: float = 0.2):
        if not 0.0 <= lam <= 1.0:
            raise ValueError("lambda must be in [0, 1]")
        self.lam = lam
        self._clock = 0
        self._entries: dict[object, _Entry] = {}

    def _decay(self, crf: float, age: int) -> float:
        return crf * (0.5 ** (self.lam * age))

    def record_access(self, key) -> None:
        self._clock += 1
        e = self._entries.get(key)
        if e is None:
            self._entries[key] = _Entry(1.0, self._clock)
        else:
            e.crf = 1.0 + self._decay(e.crf, self._clock - e.last_access)
            e.last_access = self._clock

    def current_crf(self, key) -> float:
        e = self._entries[key]
        return self._decay(e.crf, self._clock - e.last_access)

    def evict_candidate(self) -> object | None:
        """The tracked key with the lowest current CRF value."""
        if not self._entries:
            return None
        return min(self._entries, key=self.current_crf)

    def remove(self, key) -> None:
        self._entries.pop(key, None)

    def __contains__(self, key) -> bool:
        return key in self._entries

    def __len__(self) -> int:
        return len(self._entries)
