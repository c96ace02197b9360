"""Table IV benchmark: stage ablation on the bench corpus."""
from benchmarks.bench_config import DELTA, ETA, N_NAMES, run_once, save_result
import pandas as pd


from repro.exp.paper_numbers import TABLE4
from repro.exp.tables import table4


def test_table4_stages(benchmark, spark, bench_corpus, bench_model):
    t = run_once(
        benchmark,
        lambda: table4(
            spark, bench_corpus, n_names=N_NAMES, eta=ETA, delta=DELTA,
            seed=0, model=bench_model,
        ),
    )
    print("\n[Table IV] measured:\n" + t.to_string(index=False))
    print("[Table IV] paper:\n" + pd.DataFrame(TABLE4).to_string())
    save_result("table4", t.to_string(index=False))
    got = t.set_index("metric")
    # The paper's headline: the GCN stage lifts recall sharply while
    # precision barely moves.
    assert got.loc["MicroR", "Improv"] > 0.1
    assert got.loc["MicroP", "Improv"] > -0.1
    assert got.loc["MicroF", "Improv"] > 0.0
