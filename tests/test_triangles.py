"""Triangle listing via Spark joins vs brute force."""
from itertools import combinations

import numpy as np
import pandas as pd
import pytest

from repro.graph.triangles import canonical_edges, triangles, vertex_triangles


def brute_triangles(edges: set[tuple[str, str]]) -> set[tuple[str, str, str]]:
    nodes = sorted({x for e in edges for x in e})
    has = lambda a, b: (min(a, b), max(a, b)) in edges  # noqa: E731
    return {
        (a, b, c)
        for a, b, c in combinations(nodes, 3)
        if has(a, b) and has(b, c) and has(a, c)
    }


@pytest.mark.spark
class TestTriangles:
    def test_single_triangle(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"u": ["a", "b", "c"], "v": ["b", "c", "a"]})
        )
        got = {tuple(r) for r in triangles(df).collect()}
        assert got == {("a", "b", "c")}

    def test_square_has_none(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"u": ["a", "b", "c", "d"], "v": ["b", "c", "d", "a"]})
        )
        assert triangles(df).count() == 0

    def test_canonical_dedup(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"u": ["b", "a", "a", "a"], "v": ["a", "b", "b", "a"]})
        )
        rows = canonical_edges(df).collect()
        assert [(r["u"], r["v"]) for r in rows] == [("a", "b")]

    def test_random_graph_vs_brute(self, spark):
        rng = np.random.default_rng(1)
        edges = {
            tuple(sorted((f"v{a}", f"v{b}")))
            for a, b in rng.integers(0, 12, size=(60, 2))
            if a != b
        }
        pdf = pd.DataFrame(sorted(edges), columns=["u", "v"])
        got = {tuple(r) for r in triangles(spark.createDataFrame(pdf)).collect()}
        assert got == brute_triangles(edges)

    def test_vertex_triangles_cover_all_corners(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"u": ["a", "b", "c", "c"], "v": ["b", "c", "a", "d"]})
        )
        vt = vertex_triangles(df).toPandas()
        assert sorted(vt.node) == ["a", "b", "c"]
        assert (vt[["a", "b", "c"]].drop_duplicates().values == [["a", "b", "c"]]).all()
