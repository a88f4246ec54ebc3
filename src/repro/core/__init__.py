"""QueryER core: analysis-aware deduplication woven into SPJ query plans.

The paper's three operators (Deduplicate, Deduplicate-Join,
Group-Entities), the supporting indices (TBI / ITBI / LI), the
Meta-Blocking stages (Block Purging, Block Filtering, Edge Pruning),
the cost-based planner (Naive vs Advanced ER solutions) and the Batch
Approach baseline live in this package.
"""
