"""Result records shared by every TCQ algorithm in this reproduction.

A temporal k-core result is reported as the subinterval that induced it
(first induction wins), its Tightest Time Interval, its vertex/edge
counts, and an edge-set ``signature`` (frozenset of stable edge ids)
that is the ground-truth identity used to cross-check algorithms.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class CoreRecord:
    """One distinct temporal k-core returned by a TCQ algorithm."""

    ts: int
    te: int
    tti: tuple[int, int]
    n_vertices: int
    n_edges: int
    signature: frozenset[int]
    edges: tuple[tuple[int, int, int], ...] | None = None

    def key(self) -> tuple:
        """Canonical identity for cross-algorithm comparison."""
        return (self.tti, self.n_vertices, self.n_edges, self.signature)


@dataclass
class QueryStats:
    """Work counters for one TCQ run (feeds Table 4 and Figure 7)."""

    cells_total: int = 0          # |{[ts,te] ⊆ [Ts,Te]}|
    cells_evaluated: int = 0      # TCD operations actually executed
    cores_collected: int = 0      # distinct cores returned
    rows_started: int = 0         # anchor rows that ran a sweep
    # OTCD pruning-rule counters (paper Table 4):
    por_triggers: int = 0
    pou_triggers: int = 0
    pol_triggers: int = 0
    por_pruned: int = 0
    pou_pruned: int = 0
    pol_pruned: int = 0
    empty_skipped: int = 0        # cells skipped because the row went empty

    def pruned_total(self) -> int:
        return self.por_pruned + self.pou_pruned + self.pol_pruned

    def pruned_pct(self) -> dict[str, float]:
        """Per-rule pruned-cell percentages of the full schedule."""
        tot = self.cells_total or 1
        return {
            "PoR": 100.0 * self.por_pruned / tot,
            "PoU": 100.0 * self.pou_pruned / tot,
            "PoL": 100.0 * self.pol_pruned / tot,
            "Total": 100.0 * self.pruned_total() / tot,
        }


@dataclass
class QueryResult:
    """Distinct cores + work stats for one TCQ run."""

    cores: list[CoreRecord] = field(default_factory=list)
    stats: QueryStats = field(default_factory=QueryStats)

    def keys(self) -> set[tuple]:
        return {c.key() for c in self.cores}

    def ttis(self) -> set[tuple[int, int]]:
        return {c.tti for c in self.cores}
