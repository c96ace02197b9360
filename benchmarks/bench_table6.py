"""Table VI benchmark: incremental disambiguation of 100/200/300 papers."""
from benchmarks.bench_config import DELTA, ETA, N_NAMES, run_once, save_result
import pandas as pd


from repro.exp.paper_numbers import TABLE6
from repro.exp.tables import table6


def test_table6_incremental(benchmark, spark, bench_corpus):
    t = run_once(
        benchmark,
        lambda: table6(
            spark, bench_corpus, n_names=N_NAMES, n_new=(100, 200, 300),
            eta=ETA, delta=DELTA, seed=0,
        ),
    )
    print("\n[Table VI] measured:\n" + t.to_string(index=False))
    print("[Table VI] paper:\n" + pd.DataFrame(TABLE6).to_string())
    save_result("table6", t.to_string(index=False))

    for _, row in t.iterrows():
        # Incremental judgement must be cheap (paper: < 50 ms/paper) —
        # allow an order of magnitude for the interpreted profile math.
        assert row["avg_ms"] < 500
        # ... and must not collapse quality (paper sees ~1 pt drops).
        assert row["MicroF+"] > row["MicroF"] - 0.15
