"""Graph similarity search and similarity centers (Defs. 1 & 2).

``similarity_search`` finds all DAGs within GED ``tau`` of a query; the
``similarity_center`` of a cluster is the DAG appearing most often across
the similarity-search results of every member — the paper's approximate
median graph used as the k-means centroid.

Two execution modes reproduce the Fig. 11b ablation:
  * ``method="astar_lsa"`` — threshold-pruned GED verification
    (:func:`repro.graphs.ged.ged_within`), the fast path;
  * ``method="direct"`` — full exact GED for every pair, then compare to
    ``tau``, the slow baseline.

Both deduplicate structurally identical DAGs via canonical keys, and the
counting is group-aware so duplicated templates (ubiquitous in execution
histories) do not inflate the pairwise work.
"""
from __future__ import annotations

from collections import Counter

from .dag import DataflowDAG
from .ged import ged, ged_within


def _dedupe(graphs: list[DataflowDAG]) -> tuple[list[DataflowDAG], list[int]]:
    """Unique representatives + multiplicity per representative."""
    reps: list[DataflowDAG] = []
    counts: list[int] = []
    index: dict[str, int] = {}
    for g in graphs:
        k = g.canonical_key()
        if k in index:
            counts[index[k]] += 1
        else:
            index[k] = len(reps)
            reps.append(g)
            counts.append(1)
    return reps, counts


def pairwise_ged_within(
    graphs: list[DataflowDAG], tau: float, method: str = "astar_lsa"
) -> dict[tuple[int, int], int]:
    """GED for every unordered pair of *unique* structures where it is
    ≤ tau. ``direct`` computes the full GED first (no pruning)."""
    if method not in ("astar_lsa", "direct"):
        raise ValueError(f"unknown method {method!r}")
    out: dict[tuple[int, int], int] = {}
    for i in range(len(graphs)):
        out[(i, i)] = 0
        for j in range(i + 1, len(graphs)):
            if method == "direct":
                d: int | None = ged(graphs[i], graphs[j])
                if d is not None and d > tau:
                    d = None
            else:
                d = ged_within(graphs[i], graphs[j], tau)
            if d is not None:
                out[(i, j)] = d
    return out


def similarity_search(
    graphs: list[DataflowDAG],
    query: DataflowDAG,
    tau: float,
    method: str = "astar_lsa",
) -> list[int]:
    """Indices of ``graphs`` whose GED to ``query`` is ≤ tau (Def. 1)."""
    hits: list[int] = []
    cache: dict[str, bool] = {}
    for i, g in enumerate(graphs):
        k = g.canonical_key()
        if k not in cache:
            if method == "direct":
                cache[k] = ged(query, g) <= tau
            else:
                cache[k] = ged_within(query, g, tau) is not None
        if cache[k]:
            hits.append(i)
    return hits


def similarity_center(
    graphs: list[DataflowDAG], tau: float, method: str = "astar_lsa"
) -> DataflowDAG:
    """The cluster member appearing most often across all members'
    similarity-search results (Def. 2) — the approximate median graph."""
    if not graphs:
        raise ValueError("empty cluster")
    reps, counts = _dedupe(graphs)
    within = pairwise_ged_within(reps, tau, method=method)
    appearance = Counter()
    for i in range(len(reps)):
        for j in range(len(reps)):
            key = (min(i, j), max(i, j))
            if key in within:
                # rep j appears in the search result of every duplicate of
                # rep i, and each of rep j's duplicates appears once.
                appearance[j] += counts[i] * counts[j]
    best = max(range(len(reps)), key=lambda j: (appearance[j], -j))
    return reps[best]
