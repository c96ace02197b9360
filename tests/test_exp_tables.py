"""Experiment-table harnesses (structure checks on small inputs)."""
import pandas as pd
import pytest

from repro.exp import paper_numbers
from repro.exp.tables import table2, table3, table4, table6


class TestPaperNumbers:
    def test_table3_methods_complete(self):
        assert set(paper_numbers.TABLE3) == {
            "AdaBoost", "GBDT", "RF", "XGBoost",
            "ANON", "NetE", "Aminer", "GHOST", "IUAD",
        }

    def test_table5_five_fractions_each(self):
        assert all(len(v) == 5 for v in paper_numbers.TABLE5.values())

    def test_table6_keys(self):
        assert set(paper_numbers.TABLE6) == {100, 200, 300}


class TestTable2:
    def test_structure(self, corpus):
        t = table2(corpus, n_names=10)
        assert list(t.columns) == ["name", "n_authors_td", "n_papers_td", "n_papers_dblp"]
        assert t.iloc[-1]["name"] == "Total"
        assert len(t) == 11

    def test_total_row_sums(self, corpus):
        t = table2(corpus, n_names=10)
        body, total = t.iloc[:-1], t.iloc[-1]
        assert total.n_authors_td == body.n_authors_td.sum()
        assert total.n_papers_dblp == body.n_papers_dblp.sum()


@pytest.mark.spark
@pytest.mark.slow
class TestTable4:
    def test_rows_and_improvement(self, spark, corpus, model):
        t = table4(spark, corpus, n_names=30, model=model)
        assert list(t.metric) == ["MicroA", "MicroP", "MicroR", "MicroF"]
        got = t.set_index("metric")
        assert (got.Improv == (got.GCN - got.SCN).round(4)).all()
        assert got.loc["MicroR", "Improv"] > 0.1  # the paper's headline result


@pytest.mark.spark
@pytest.mark.slow
class TestTable6:
    def test_structure(self, spark, corpus):
        t = table6(spark, corpus, n_names=20, n_new=(40,), eta=4, delta=6.0)
        assert list(t.n_new) == [40]
        row = t.iloc[0]
        for k in ("MicroA", "MicroP", "MicroR", "MicroF"):
            assert 0 <= row[k] <= 1 and 0 <= row[f"{k}+"] <= 1
        assert row.avg_ms > 0

    def test_incremental_does_not_collapse(self, spark, corpus):
        t = table6(spark, corpus, n_names=20, n_new=(40,), eta=4, delta=6.0)
        row = t.iloc[0]
        # the paper observes only a slight reduction after increment
        assert row["MicroF+"] > row["MicroF"] - 0.15
