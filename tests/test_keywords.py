"""Keyword extraction dataflow + DuckDB oracle for frequency counts."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.dblp.generator import PAPER_SCHEMA
from repro.oracle import assert_equivalent
from repro.text.keywords import keyword_frequencies, keywords, title_tokens


@pytest.fixture(scope="module")
def kw_papers(spark):
    rows = [
        (0, [0], ["n0"], "the deep graph model", "V", 2000),
        (1, [1], ["n1"], "a deep network study", "V", 2001),
        (2, [2], ["n2"], "deep graph network", "V", 2002),
        (3, [3], ["n3"], "common common common", "V", 2003),
    ]
    pdf = pd.DataFrame(
        rows, columns=["paper_id", "authors", "names", "title", "venue", "year"]
    )
    return spark.createDataFrame(pdf, schema=PAPER_SCHEMA).cache()


@pytest.mark.spark
class TestKeywords:
    def test_tokens_lowercased_split(self, spark, kw_papers):
        toks = title_tokens(kw_papers).toPandas()
        assert set(toks[toks.paper_id == 2].token) == {"deep", "graph", "network"}

    def test_stopwords_removed(self, spark, kw_papers):
        kws = keywords(kw_papers, top_frequent_cut=1.0).toPandas()
        assert "the" not in set(kws.keyword)
        assert "a" not in set(kws.keyword)

    def test_frequent_words_cut(self, spark, kw_papers):
        # 'deep' appears in 3/4 papers = 75 % > 60 % cut; 'graph' in 2/4.
        kws = keywords(kw_papers, top_frequent_cut=0.6).toPandas()
        assert "deep" not in set(kws.keyword)
        assert "graph" in set(kws.keyword)

    def test_deduplicated_within_paper(self, spark, kw_papers):
        kws = keywords(kw_papers, top_frequent_cut=1.0).toPandas()
        sub = kws[kws.paper_id == 3]
        assert list(sub.keyword) == ["common"]

    def test_fb_counts_oracle(self, spark, kw_papers):
        kw = keywords(kw_papers, top_frequent_cut=1.0)
        assert_equivalent(
            keyword_frequencies(kw).select("keyword", F.col("fb").cast("long").alias("fb")),
            """
            SELECT keyword, COUNT(DISTINCT paper_id)::BIGINT AS fb
            FROM kw GROUP BY keyword
            """,
            kw=kw,
        )

    def test_corpus_keywords_exclude_generator_stopwords(self, spark, papers_df):
        from repro.dblp.generator import STOPWORDS

        kws = keywords(papers_df).select("keyword").distinct().toPandas()
        assert not (set(kws.keyword) & set(STOPWORDS))
