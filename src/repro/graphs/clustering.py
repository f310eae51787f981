"""GED-based k-means over dataflow DAGs (paper §IV-C).

Centroids are *similarity centers* (approximate median graphs), not
averages; the assignment step computes GED from every DAG to every
centroid. Because execution histories contain many structurally identical
DAGs, all GED work is deduplicated through canonical keys and a
:class:`repro.graphs.ged.GEDCache`, and the assignment step can fan out
over Spark (one task per unique structure) via ``assign_with_spark``.

``elbow_k`` picks k by the elbow method (max second difference of the
within-cluster distance curve), as in the paper's pre-training setup.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from .dag import DataflowDAG
from .ged import GEDCache
from .similarity import similarity_center


@dataclass
class ClusteringResult:
    centers: list[DataflowDAG]
    assignments: list[int]
    inertia: float  # total GED to assigned centers
    n_iter: int


def _assign_local(
    graphs: list[DataflowDAG], centers: list[DataflowDAG], cache: GEDCache
) -> tuple[list[int], float]:
    assignments: list[int] = []
    inertia = 0.0
    for g in graphs:
        dists = [cache(g, c) for c in centers]
        k = int(np.argmin(dists))
        assignments.append(k)
        inertia += dists[k]
    return assignments, inertia


def assign_with_spark(
    spark,
    graphs: list[DataflowDAG],
    centers: list[DataflowDAG],
) -> tuple[list[int], float]:
    """Distributed assignment step: one row per *unique* DAG structure,
    GEDs to all centers computed in parallel with ``mapInPandas``."""
    import pandas as pd
    from pyspark.sql import functions as F  # noqa: F401
    from pyspark.sql.types import (
        DoubleType,
        IntegerType,
        StructField,
        StructType,
    )

    keys = [g.canonical_key() for g in graphs]
    uniq: dict[str, DataflowDAG] = {}
    for k, g in zip(keys, graphs):
        uniq.setdefault(k, g)
    rows = [(i, g.to_json()) for i, g in enumerate(uniq.values())]
    center_json = [c.to_json() for c in centers]
    schema = StructType(
        [
            StructField("uid", IntegerType()),
            StructField("cluster", IntegerType()),
            StructField("dist", DoubleType()),
        ]
    )

    def _compute(batches):
        from repro.graphs.dag import DataflowDAG as D
        from repro.graphs.ged import ged as _ged

        cents = [D.from_json(s) for s in center_json]
        for pdf in batches:
            out = []
            for uid, gj in zip(pdf["uid"], pdf["graph_json"]):
                g = D.from_json(gj)
                dists = [_ged(g, c) for c in cents]
                k = int(np.argmin(dists))
                out.append((int(uid), k, float(dists[k])))
            yield pd.DataFrame(out, columns=["uid", "cluster", "dist"])

    sdf = spark.createDataFrame(
        pd.DataFrame(rows, columns=["uid", "graph_json"])
    )
    res = sdf.mapInPandas(_compute, schema=schema).toPandas()
    by_uid = {int(r.uid): (int(r.cluster), float(r.dist)) for r in res.itertuples()}
    uniq_keys = list(uniq.keys())
    key_to_uid = {k: i for i, k in enumerate(uniq_keys)}
    assignments, inertia = [], 0.0
    for k in keys:
        c, d = by_uid[key_to_uid[k]]
        assignments.append(c)
        inertia += d
    return assignments, inertia


def kmeans_ged(
    graphs: list[DataflowDAG],
    k: int,
    *,
    tau: float = 5.0,
    max_iter: int = 10,
    seed: int = 0,
    spark=None,
) -> ClusteringResult:
    """K-means with GED distances and similarity-center centroids."""
    if k < 1 or k > len(graphs):
        raise ValueError(f"k={k} out of range for {len(graphs)} graphs")
    rng = np.random.default_rng(seed)
    cache = GEDCache()
    # Initialise on distinct structures when possible, so two centroids do
    # not start (and stay) identical.
    uniq_idx: list[int] = []
    seen: set[str] = set()
    for i, g in enumerate(graphs):
        ck = g.canonical_key()
        if ck not in seen:
            seen.add(ck)
            uniq_idx.append(i)
    pool = uniq_idx if len(uniq_idx) >= k else list(range(len(graphs)))
    picks = rng.choice(len(pool), size=k, replace=False)
    centers = [graphs[pool[int(j)]] for j in picks]
    assignments: list[int] = []
    inertia = 0.0
    it = 0
    for it in range(1, max_iter + 1):
        if spark is not None:
            new_assign, inertia = assign_with_spark(spark, graphs, centers)
        else:
            new_assign, inertia = _assign_local(graphs, centers, cache)
        if new_assign == assignments:
            assignments = new_assign
            break
        assignments = new_assign
        new_centers: list[DataflowDAG] = []
        for c in range(k):
            members = [g for g, a in zip(graphs, assignments) if a == c]
            if members:
                new_centers.append(similarity_center(members, tau))
            else:  # empty cluster: reseed on the farthest graph
                far = max(
                    range(len(graphs)),
                    key=lambda i: cache(graphs[i], centers[assignments[i]]),
                )
                new_centers.append(graphs[far])
        if all(
            a.canonical_key() == b.canonical_key()
            for a, b in zip(centers, new_centers)
        ):
            break
        centers = new_centers
    return ClusteringResult(centers, assignments, float(inertia), it)


def elbow_k(
    graphs: list[DataflowDAG],
    *,
    k_max: int = 6,
    tau: float = 5.0,
    seed: int = 0,
) -> int:
    """Elbow method: k with the largest curvature (second difference) of
    the inertia curve; falls back to the largest useful k on degenerate
    curves."""
    n_uniq = len({g.canonical_key() for g in graphs})
    k_hi = min(k_max, n_uniq, len(graphs))
    inertias = [
        kmeans_ged(graphs, k, tau=tau, seed=seed).inertia
        for k in range(1, k_hi + 1)
    ]
    if len(inertias) < 3:
        return len(inertias)
    curv = np.diff(inertias, 2)  # curvature at k = 2..k_hi-1
    return int(np.argmax(curv)) + 2


def nearest_center(g: DataflowDAG, centers: list[DataflowDAG]) -> int:
    """Cluster id of the nearest centroid (Algorithm 2, line 1)."""
    from .ged import ged

    return int(np.argmin([ged(g, c) for c in centers]))
