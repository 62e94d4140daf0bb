"""Helpers for level-synchronous iterative DataFrame algorithms.

Every Pregel-style metric in this repo (BFS/Bellman-Ford, PageRank, power
iteration, Katz, label propagation, connected components) is a loop of
``join frontier with adjacency -> aggregate -> compare``. Two practical
concerns are factored out here:

* **Lineage control** — each iteration adds a join + aggregate to the
  plan; after a few dozen rounds Catalyst analysis dominates runtime.
  ``materialize`` localCheckpoints eagerly to truncate lineage.
* **Convergence actions** — convergence checks need an action per round;
  we standardize on cheap single-row aggregates.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import DataFrame


def materialize(df: DataFrame) -> DataFrame:
    """Eagerly localCheckpoint ``df``, truncating its lineage."""
    return df.localCheckpoint(eager=True)


def loop(
    state: DataFrame,
    step: Callable[[DataFrame, int], DataFrame],
    *,
    max_iter: int,
    done: Callable[[DataFrame, DataFrame], bool] | None = None,
    checkpoint_every: int = 1,
) -> DataFrame:
    """Run ``state = step(state, i)`` until ``done`` or ``max_iter``.

    ``done(prev, new)`` may run actions (counts/aggregates); it is called
    after each step. The state is localCheckpointed every
    ``checkpoint_every`` iterations (and always before returning) so the
    caller never receives an unboundedly deep plan.
    """
    state = materialize(state)
    for i in range(max_iter):
        new = step(state, i)
        if (i + 1) % checkpoint_every == 0:
            new = materialize(new)
        if done is not None and done(state, new):
            state = new
            break
        state = new
    return materialize(state)
