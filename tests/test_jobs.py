"""The spark-submit job entrypoints run end-to-end at tiny scale."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def load_job(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    sys.modules[name] = mod
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.slow
@pytest.mark.parametrize(
    "job,args",
    [
        ("table3_learning", ["--sf", "0.0004", "--datasets", "flight"]),
        ("table4_single_table",
         ["--sf", "0.0004", "--rates", "0.2", "--datasets", "flight",
          "--methods", "low", "systemds"]),
        ("table5_ncols", ["--sf", "0.0004", "--rates", "0.2", "--max-cols", "1"]),
        ("table6_normalized",
         ["--sf", "0.002", "--rates", "0.2", "--datasets", "retailer"]),
        ("table7_quality",
         ["--sf", "0.006", "--methods", "mice_spark", "mean", "--fast",
          "--mice-iters", "1"]),
        ("table8_patterns",
         ["--dataset", "flight", "--sf", "0.0004", "--rates", "0.2",
          "--patterns", "MCAR", "--methods", "mean", "--mice-iters", "1"]),
    ],
)
def test_job_runs_and_writes_table(spark, tmp_path, job, args):
    mod = load_job(job)
    out = tmp_path / f"{job}.md"
    rows = mod.main(args + ["--out", str(out)])
    assert rows, f"{job} produced no rows"
    text = out.read_text()
    assert text.startswith("| ")
    assert len(text.splitlines()) >= 3  # header + separator + >=1 row
