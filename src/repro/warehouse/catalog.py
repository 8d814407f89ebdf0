"""Bounded Memory Catalog accounting (paper §III-C).

Tracks which flagged MV outputs are currently memory-resident and
enforces the byte budget ``M``. Sizes are the *estimated* sizes the
Optimizer planned with (paper §III-A execution metadata) — the same
contract as S/C's Presto implementation, where the plan is made from
past-run estimates, not live measurements.
"""
from __future__ import annotations

from dataclasses import dataclass, field


class CatalogOverflowError(RuntimeError):
    """Adding an entry would exceed the Memory Catalog budget — the plan
    was infeasible, which the Optimizer must never emit."""


@dataclass
class MemoryCatalog:
    budget: float
    entries: dict[str, float] = field(default_factory=dict)
    peak: float = 0.0

    @property
    def used(self) -> float:
        return sum(self.entries.values())

    def add(self, name: str, nbytes: float) -> None:
        if name in self.entries:
            raise ValueError(f"{name!r} already in Memory Catalog")
        if self.used + nbytes > self.budget + 1e-9:
            raise CatalogOverflowError(
                f"adding {name!r} ({nbytes:.0f} B) exceeds budget "
                f"{self.budget:.0f} B (used {self.used:.0f} B)"
            )
        self.entries[name] = nbytes
        self.peak = max(self.peak, self.used)

    def release(self, name: str) -> None:
        del self.entries[name]

    def __contains__(self, name: str) -> bool:
        return name in self.entries
