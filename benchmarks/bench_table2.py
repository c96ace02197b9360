"""Table II benchmark: testing-set selection over the bench corpus."""
from benchmarks.bench_config import N_NAMES, run_once, save_result


from repro.exp.paper_numbers import TABLE2_TOTALS
from repro.exp.tables import table2


def test_table2_stats(benchmark, bench_corpus):
    t = run_once(benchmark, lambda: table2(bench_corpus, n_names=N_NAMES))
    total = t.iloc[-1]
    print("\n[Table II] measured totals:",
          {k: int(total[k]) for k in ("n_authors_td", "n_papers_td", "n_papers_dblp")})
    print("[Table II] paper totals:   ", TABLE2_TOTALS)
    save_result("table2", t.to_string(index=False))
    assert len(t) == N_NAMES + 1
    assert (t.iloc[:-1].n_authors_td >= 2).all()
