"""Spark-parallel k-means assignment must agree with the local path."""
import pytest

from repro.graphs.clustering import _assign_local, assign_with_spark, kmeans_ged
from repro.graphs.dag import DataflowDAG, Operator
from repro.graphs.ged import GEDCache


def chain(name, types):
    ops = [Operator(f"o{i}", t) for i, t in enumerate(types)]
    edges = [(f"o{i}", f"o{i+1}") for i in range(len(types) - 1)]
    sources = {o.op_id: "s" for o in ops if o.op_type == "source"}
    return DataflowDAG(name, ops, edges, sources)


@pytest.fixture(scope="module")
def graphs():
    fam_a = [chain(f"a{i}", ["source", "map", "sink"]) for i in range(4)]
    fam_b = [
        chain(f"b{i}", ["source", "filter", "join", "aggregate", "sink"])
        for i in range(4)
    ]
    return fam_a + fam_b


class TestSparkAssignment:
    def test_parity_with_local(self, spark, graphs):
        centers = [graphs[0], graphs[4]]
        local_assign, local_inertia = _assign_local(graphs, centers, GEDCache())
        dist_assign, dist_inertia = assign_with_spark(spark, graphs, centers)
        assert dist_assign == local_assign
        assert dist_inertia == pytest.approx(local_inertia)

    def test_kmeans_with_spark_backend(self, spark, graphs):
        res = kmeans_ged(graphs, k=2, seed=0, spark=spark)
        assert len(set(res.assignments[:4])) == 1
        assert len(set(res.assignments[4:])) == 1
        assert res.assignments[0] != res.assignments[4]
