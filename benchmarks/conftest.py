"""Benchmark fixtures: one bench-scale corpus + one fitted model per session.

Scale via REPRO_BENCH_SF (default 0.1 ≈ 20 000 papers). Table harnesses are
run once per benchmark (pedantic single round) — they are end-to-end
experiments, not microbenchmarks.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "16")

import pytest  # noqa: E402

from benchmarks.bench_config import BENCH_SEED, BENCH_SF, DELTA, ETA  # noqa: E402
from repro.dblp.generator import generate  # noqa: E402


@pytest.fixture(scope="session")
def bench_corpus():
    return generate(sf=BENCH_SF, seed=BENCH_SEED)


@pytest.fixture(scope="session")
def bench_model(spark, bench_corpus):
    from repro.core.pipeline import run_iuad

    return run_iuad(
        spark, bench_corpus.to_spark(spark), eta=ETA, delta=DELTA, seed=0
    )
