"""Job entrypoints: argument plumbing (no Spark submission here)."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"


def load(name: str):
    sys.path.insert(0, str(JOBS))
    try:
        spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.remove(str(JOBS))


class TestCommon:
    def test_parser_defaults(self):
        common = load("_common")
        args = common.base_parser("x").parse_args([])
        assert args.sf == 0.1
        assert args.eta == 5
        assert args.delta == 0.0
        assert args.names == 50

    def test_parser_overrides(self):
        common = load("_common")
        args = common.base_parser("x").parse_args(
            ["--sf", "0.02", "--eta", "3", "--delta", "4.5", "--names", "10"]
        )
        assert (args.sf, args.eta, args.delta, args.names) == (0.02, 3, 4.5, 10)


@pytest.mark.parametrize(
    "job",
    ["run_iuad", "table2_stats", "table3_baselines", "table4_stages",
     "table5_scaling", "table6_incremental"],
)
def test_job_module_loads_and_has_main(job):
    mod = load(job)
    assert callable(mod.main)
