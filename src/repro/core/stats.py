"""Counters collected during a branch-and-bound run.

These back the quantities reported in the paper's tables:

- ``calls``      — recursive branch calls (vertex-oriented kernel calls plus
                   edge-oriented recursion calls), the "#Calls" columns of
                   Tables IV and V.
- ``et_plex``    — branches whose candidate graph is a t-plex (the ``b`` of
                   Table V's Ratio column).
- ``et_applied`` — branches early-terminated (t-plex *and* empty exclusion
                   graph, the ``b0`` of Table V).
- ``cliques``    — maximal cliques emitted.
- ``root_branches`` — branches created at the initial branch (m edge branches
                   for HBBMC/EBBMC, n vertex branches for VBBMC).
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class BranchStats:
    calls: int = 0
    et_plex: int = 0
    et_applied: int = 0
    cliques: int = 0
    root_branches: int = 0
    gr_cliques: int = 0  # cliques emitted directly by graph reduction

    def ratio(self) -> float:
        """Table V's Ratio = b0 / b (0 when no t-plex branch was seen)."""
        return self.et_applied / self.et_plex if self.et_plex else 0.0

    def merge(self, other: "BranchStats") -> None:
        self.calls += other.calls
        self.et_plex += other.et_plex
        self.et_applied += other.et_applied
        self.cliques += other.cliques
        self.root_branches += other.root_branches
        self.gr_cliques += other.gr_cliques

    def as_dict(self) -> dict[str, int]:
        return {
            "calls": self.calls,
            "et_plex": self.et_plex,
            "et_applied": self.et_applied,
            "cliques": self.cliques,
            "root_branches": self.root_branches,
            "gr_cliques": self.gr_cliques,
        }

    @classmethod
    def from_dict(cls, d: dict[str, int]) -> "BranchStats":
        return cls(**{k: int(v) for k, v in d.items()})
