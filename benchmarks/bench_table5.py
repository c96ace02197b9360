"""Table V benchmark: per-name time at 20..100 % of the data, 5 methods."""
from benchmarks.bench_config import DELTA, ETA, N_NAMES, run_once, save_result
import pandas as pd


from repro.exp.paper_numbers import TABLE5
from repro.exp.tables import table5


def test_table5_scaling(benchmark, spark, bench_corpus):
    t = run_once(
        benchmark,
        lambda: table5(
            spark, bench_corpus, n_names=N_NAMES, eta=ETA, delta=DELTA, seed=0
        ),
    )
    paper = pd.DataFrame(TABLE5, index=["20%", "40%", "60%", "80%", "100%"]).T
    print("\n[Table V] measured (s/name):\n" + t.to_string(index=False))
    print("[Table V] paper (s/name):\n" + paper.to_string())
    save_result("table5", t.to_string(index=False))

    ours = t.set_index("method")
    # Shape: the top-down baselines get slower per name with more data;
    # GHOST's path computation scales worst in absolute growth. IUAD's
    # per-name cost is amortized over every name in the corpus, so it may
    # stay flat or shrink (its fixed Spark overhead amortizes) — the
    # paper's efficiency claim, not asserted as growth.
    for m in ("ANON", "NetE", "Aminer", "GHOST"):
        assert ours.loc[m, "100%"] >= ours.loc[m, "20%"] * 0.8
    growth = ours["100%"] - ours["20%"]
    assert growth["GHOST"] == growth[["ANON", "NetE", "Aminer", "GHOST"]].max()
