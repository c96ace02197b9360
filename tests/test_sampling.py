"""Vertex splitting for EM training balance (§ V-F.2)."""
import numpy as np
import pytest

from repro.core.gammas import CorpusStats
from repro.core.sampling import split_profile, synthetic_matched_gammas
from tests.test_gammas import mk_profile


@pytest.fixture
def stats():
    return CorpusStats(
        fb={"kw1": 10, "kw2": 30},
        fh={"V1": 10, "V2": 40},
        word_vectors={"kw1": np.array([1.0, 0.0]), "kw2": np.array([0.0, 1.0])},
        dim=2,
    )


def big_profile():
    return mk_profile(
        vid="n#big",
        n_papers=20,
        venues={"V1": 12, "V2": 8},
        keywords={"kw1": (10, 1995, 2005), "kw2": (6, 1999, 2008)},
        wl={"0:a": 3.0},
        triangles={"a|b"},
    )


class TestSplitProfile:
    def test_counts_conserved(self):
        rng = np.random.default_rng(0)
        p = big_profile()
        a, b = split_profile(p, rng)
        for v in set(p.venues):
            assert a.venues.get(v, 0) + b.venues.get(v, 0) == p.venues[v]
        for k, (c, _, _) in p.keywords.items():
            ca = a.keywords.get(k, (0,))[0]
            cb = b.keywords.get(k, (0,))[0]
            assert ca + cb == c

    def test_paper_counts_positive(self):
        rng = np.random.default_rng(1)
        for _ in range(20):
            a, b = split_profile(big_profile(), rng)
            assert a.n_papers >= 1 and b.n_papers >= 1

    def test_structure_dropped(self):
        """Halves must look like genuine cross-phase pairs: no shared WL
        map or triangles (see sampling.py rationale)."""
        a, b = split_profile(big_profile(), np.random.default_rng(0))
        assert a.wl == {} and b.wl == {}
        assert a.triangles == frozenset() and b.triangles == frozenset()

    def test_same_name_distinct_ids(self):
        a, b = split_profile(big_profile(), np.random.default_rng(0))
        assert a.name == b.name == "n"
        assert a.vertex_id != b.vertex_id

    def test_year_ranges_preserved(self):
        a, b = split_profile(big_profile(), np.random.default_rng(0))
        for half in (a, b):
            for k, (_, lo, hi) in half.keywords.items():
                assert (lo, hi) == big_profile().keywords[k][1:]


class TestSyntheticMatchedGammas:
    def test_shape(self, stats):
        X = synthetic_matched_gammas([big_profile()], stats, n=15, seed=0)
        assert X.shape == (15, 6)

    def test_high_similarity_rows(self, stats):
        """Split halves of one author must look similar on venue features."""
        X = synthetic_matched_gammas([big_profile()], stats, n=40, seed=0)
        assert X[:, 4].mean() > 0.8  # γ5: shared modal venues
        assert X[:, 5].mean() > 0.04  # γ6: common venues

    def test_empty_without_prolific(self, stats):
        small = mk_profile(n_papers=2)
        assert synthetic_matched_gammas([small], stats, n=10).shape == (0, 6)

    def test_deterministic_in_seed(self, stats):
        a = synthetic_matched_gammas([big_profile()], stats, n=8, seed=5)
        b = synthetic_matched_gammas([big_profile()], stats, n=8, seed=5)
        np.testing.assert_array_equal(a, b)
