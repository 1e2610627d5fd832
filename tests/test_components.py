"""Tests for connected components: Spark label propagation vs union-find."""
import numpy as np
import pandas as pd
import pytest

from repro.transitivity.components import (
    components_unionfind,
    connected_components,
)


class TestUnionFind:
    def test_simple_chain(self):
        comp = components_unionfind(np.array([1, 2]), np.array([2, 3]))
        assert comp[1] == comp[2] == comp[3] == 1

    def test_two_components(self):
        comp = components_unionfind(np.array([1, 5]), np.array([2, 6]))
        assert comp[1] == comp[2]
        assert comp[5] == comp[6]
        assert comp[1] != comp[5]

    def test_component_label_is_min(self):
        comp = components_unionfind(np.array([9, 9]), np.array([4, 2]))
        assert comp[9] == comp[4] == comp[2] == 2

    def test_empty(self):
        assert components_unionfind(np.array([]), np.array([])) == {}

    def test_self_loop(self):
        comp = components_unionfind(np.array([3]), np.array([3]))
        assert comp == {3: 3}


def _random_edges(seed, n_nodes=40, n_edges=60):
    g = np.random.default_rng(seed)
    src = g.integers(0, n_nodes, n_edges)
    dst = g.integers(0, n_nodes, n_edges)
    return src, dst


class TestSparkCC:
    def test_matches_unionfind_small(self, spark):
        src = np.array([1, 2, 10, 11])
        dst = np.array([2, 3, 11, 12])
        edges = spark.createDataFrame(
            pd.DataFrame({"src": src, "dst": dst})
        )
        got = {
            r["node"]: r["component"]
            for r in connected_components(edges).collect()
        }
        assert got == components_unionfind(src, dst)

    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_matches_unionfind_random(self, spark, seed):
        src, dst = _random_edges(seed)
        edges = spark.createDataFrame(pd.DataFrame({"src": src, "dst": dst}))
        got = {
            r["node"]: r["component"]
            for r in connected_components(edges).collect()
        }
        assert got == components_unionfind(src, dst)

    def test_long_path_converges(self, spark):
        # a 30-node path needs multiple propagation rounds
        src = np.arange(0, 29)
        dst = np.arange(1, 30)
        edges = spark.createDataFrame(pd.DataFrame({"src": src, "dst": dst}))
        got = connected_components(edges).toPandas()
        assert (got.component == 0).all()
        assert len(got) == 30
