"""Configuration for the ER pipeline inside the Deduplicate operator.

A single frozen dataclass threaded through every stage so that the
Dedupe Query (DQ) and the Batch Approach (BA) provably run the *same*
deterministic functions — the paper's DQ-Correctness argument (Sec. 6.1)
rests on blocking, meta-blocking, comparison and grouping being
deterministic and identically configured on both paths.
"""
from __future__ import annotations

from dataclasses import dataclass, replace


@dataclass(frozen=True)
class ERConfig:
    """Knobs for blocking, meta-blocking and matching.

    Defaults mirror the paper's fixed configuration (Sec. 9.1): Token
    Blocking, Block Purging + Block Filtering + Edge Pruning ("ALL"),
    Jaro-Winkler matching. ``filter_ratio`` is the standard Block
    Filtering ratio from Papadakis et al.; ``purge_smoothing`` is the
    paper's SF = 1.025.
    """

    # --- blocking ---
    min_token_len: int = 2

    # --- meta-blocking stages (Table 8 toggles these) ---
    block_purging: bool = True
    purge_smoothing: float = 1.025
    block_filtering: bool = True
    filter_ratio: float = 0.8
    edge_pruning: bool = True

    # --- matching ---
    # Calibrated on held-out corrupted samples of every synthetic
    # family (tests/test_similarity.py): matches cluster above ~0.6,
    # non-matches below ~0.5 on 4+-attribute tables.
    sim_threshold: float = 0.55
    jw_weight: float = 0.5
    # Schema-based alternative (Sec. 6.1: "any schema-based alternative
    # can be used"): optional per-attribute weights, as (name, weight)
    # pairs to keep the dataclass hashable; None = uniform weights.
    attribute_weights: tuple[tuple[str, float], ...] | None = None
    # Thorough matcher (cross-attribute Monge-Elkan) — accurate on tiny
    # heterogeneous tables, too slow for bulk runs; see similarity.py.
    thorough_matcher: bool = False

    @property
    def weights_dict(self) -> dict[str, float] | None:
        return dict(self.attribute_weights) if self.attribute_weights else None

    def with_stages(
        self, *, bp: bool = True, bf: bool = True, ep: bool = True
    ) -> "ERConfig":
        """Meta-blocking configuration variants for the Table 8 sweep:
        ALL = (bp, bf, ep), BP+BF = (bp, bf), BP+EP = (bp, ep)."""
        return replace(
            self, block_purging=bp, block_filtering=bf, edge_pruning=ep
        )


DEFAULT_CONFIG = ERConfig()
