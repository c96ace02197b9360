"""Stage II merging: thresholding, transitive closure, GCN assembly."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.em import EMParams, FeatureParams
from repro.core.gcn import build_gcn, merge_mapping, score_pairs
from repro.core.gammas import GAMMA_NAMES


def pairs_pdf(rows):
    cols = ["name", "vid_i", "vid_j", "score"]
    return pd.DataFrame(rows, columns=cols)


def vertices_pdf(rows):
    return pd.DataFrame(rows, columns=["name", "vertex_id"])


@pytest.mark.spark
class TestMergeMapping:
    def test_threshold_respected(self, spark):
        pairs = spark.createDataFrame(
            pairs_pdf([("n", "n#a", "n#b", 5.0), ("n", "n#b", "n#c", -1.0)])
        )
        verts = spark.createDataFrame(
            vertices_pdf([("n", "n#a"), ("n", "n#b"), ("n", "n#c")])
        )
        m = merge_mapping(pairs, verts, delta=0.0).toPandas()
        got = dict(zip(m.vertex_id, m.gcn_vertex))
        assert got["n#a"] == got["n#b"]
        assert got["n#c"] == "n#c"

    def test_transitive_closure(self, spark):
        pairs = spark.createDataFrame(
            pairs_pdf([("n", "n#a", "n#b", 9.0), ("n", "n#b", "n#c", 9.0)])
        )
        verts = spark.createDataFrame(
            vertices_pdf([("n", "n#a"), ("n", "n#b"), ("n", "n#c")])
        )
        m = merge_mapping(pairs, verts, delta=0.0).toPandas()
        assert m.gcn_vertex.nunique() == 1

    def test_names_never_cross(self, spark):
        pairs = spark.createDataFrame(
            pairs_pdf([("n", "n#a", "n#b", 9.0), ("m", "m#a", "m#b", 9.0)])
        )
        verts = spark.createDataFrame(
            vertices_pdf([("n", "n#a"), ("n", "n#b"), ("m", "m#a"), ("m", "m#b")])
        )
        m = merge_mapping(pairs, verts, delta=0.0).toPandas()
        for r in m.itertuples(index=False):
            assert r.gcn_vertex.startswith(r.name)

    def test_infinite_delta_identity(self, spark):
        pairs = spark.createDataFrame(pairs_pdf([("n", "n#a", "n#b", 100.0)]))
        verts = spark.createDataFrame(vertices_pdf([("n", "n#a"), ("n", "n#b")]))
        m = merge_mapping(pairs, verts, delta=1e9).toPandas()
        assert (m.vertex_id == m.gcn_vertex).all()


@pytest.mark.spark
class TestScorePairs:
    def test_adds_score_column(self, spark):
        params = EMParams(
            p=0.5,
            features={
                g: FeatureParams("gaussian", {"mu": 1.0, "var": 1.0}, {"mu": 0.0, "var": 1.0})
                for g in GAMMA_NAMES
            },
        )
        pdf = pd.DataFrame(
            [["n", "n#a", "n#b"] + [1.0] * 6, ["n", "n#a", "n#c"] + [0.0] * 6],
            columns=["name", "vid_i", "vid_j", *GAMMA_NAMES],
        )
        out = score_pairs(spark.createDataFrame(pdf), params).toPandas()
        assert out.loc[0, "score"] > out.loc[1, "score"]


@pytest.mark.spark
class TestBuildGcn:
    def _scn_assignments(self, spark):
        return spark.createDataFrame(
            pd.DataFrame(
                {
                    "paper_id": [1, 2, 3, 4],
                    "name": ["n", "n", "n", "m"],
                    "vertex_id": ["n#a", "n#b", "n#c", "m#z"],
                    "stable": [True, True, False, True],
                }
            )
        )

    def test_rekeys_assignments(self, spark):
        scored = spark.createDataFrame(
            pairs_pdf([("n", "n#a", "n#b", 5.0), ("n", "n#a", "n#c", -5.0)])
        )
        gcn = build_gcn(self._scn_assignments(spark), scored, delta=0.0)
        asg = gcn.assignments.toPandas().set_index("paper_id")
        assert asg.loc[1, "gcn_vertex"] == asg.loc[2, "gcn_vertex"]
        assert asg.loc[3, "gcn_vertex"] == "n#c"
        assert asg.loc[4, "gcn_vertex"] == "m#z"

    def test_recovered_edges_from_coauthor_lists(self, spark):
        """Line 16: vertices sharing a paper get a collaboration edge."""
        asg = spark.createDataFrame(
            pd.DataFrame(
                {
                    "paper_id": [1, 1, 2],
                    "name": ["n", "m", "n"],
                    "vertex_id": ["n#a", "m#z", "n#a"],
                    "stable": [True, True, True],
                }
            )
        )
        scored = spark.createDataFrame(pairs_pdf([("n", "n#a", "n#a2", -99.0)]))
        gcn = build_gcn(asg, scored, delta=0.0)
        edges = {(r.u, r.v): r.cnt for r in gcn.edges.collect()}
        assert edges == {("m#z", "n#a"): 1}
