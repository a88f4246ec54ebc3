"""Instrumentation: per-stage wall-clock and comparison counts.

The paper reports, per query, the total time TT, its breakdown across
Block-Join / Meta-Blocking / Resolution (Comparison-Execution) /
Group / Other (Table 6), and the number of executed comparisons
(Figs. 9-13). ``StageTimer`` wraps each stage; because Spark is lazy,
stages that want accurate attribution must materialise their output
inside the timed region (the operator does so via counts on cached
frames) — this is deliberate and documented in DESIGN.md.
"""
from __future__ import annotations

import time
from contextlib import contextmanager
from dataclasses import dataclass, field


@dataclass
class QueryMetrics:
    """Timings (seconds) and counters for one Dedupe query."""

    stage_seconds: dict[str, float] = field(default_factory=dict)
    comparisons: int = 0
    candidate_comparisons_before_mb: int = 0
    qe_size: int = 0
    dr_size: int = 0
    matches: int = 0

    @contextmanager
    def stage(self, name: str):
        t0 = time.perf_counter()
        try:
            yield
        finally:
            self.stage_seconds[name] = self.stage_seconds.get(name, 0.0) + (
                time.perf_counter() - t0
            )

    @property
    def total_seconds(self) -> float:
        return sum(self.stage_seconds.values())

    def breakdown(self) -> dict[str, float]:
        """Stage -> fraction of total time, in the Table 6 layout."""
        tt = self.total_seconds
        if tt <= 0:
            return {k: 0.0 for k in self.stage_seconds}
        return {k: v / tt for k, v in self.stage_seconds.items()}

    def merge(self, other: "QueryMetrics") -> None:
        for k, v in other.stage_seconds.items():
            self.stage_seconds[k] = self.stage_seconds.get(k, 0.0) + v
        self.comparisons += other.comparisons
        self.candidate_comparisons_before_mb += (
            other.candidate_comparisons_before_mb
        )
        self.matches += other.matches


def pair_completeness(
    found_cooccurring: set[tuple[int, int]],
    ground_truth: set[tuple[int, int]],
    qe_ids: set[int],
) -> float:
    """PC (Sec. 9.1): the portion of ground-truth duplicates of the
    query's QE entities that still co-occur after Meta-Blocking.

    Pairs are canonical (min, max). Only GT pairs touching QE count —
    a Dedupe query is only responsible for resolving its selection.
    """
    relevant = {
        p for p in ground_truth if p[0] in qe_ids or p[1] in qe_ids
    }
    if not relevant:
        return 1.0
    return len(relevant & found_cooccurring) / len(relevant)
