"""Shared benchmark configuration and helpers (importable module — the
conftest name itself collides with the root conftest)."""
import os

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))
BENCH_SEED = 7
# η = 5 at SF = 0.1 reproduces the paper's Table IV Stage-I operating point
# (P ≈ .92 / R ≈ .44 vs the paper's .87 / .44); δ = 0 is the natural
# posterior-odds decision boundary.
ETA = 5
DELTA = 0.0
N_NAMES = 50


def run_once(benchmark, fn):
    """Run an end-to-end harness exactly once under the benchmark timer."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)


def save_result(name: str, text: str) -> None:
    """Persist a measured table under benchmarks/results/ — pytest captures
    stdout, so the printed tables would otherwise only live in -s runs."""
    out = os.path.join(os.path.dirname(__file__), "results")
    os.makedirs(out, exist_ok=True)
    with open(os.path.join(out, f"{name}.txt"), "w") as f:
        f.write(text + "\n")
