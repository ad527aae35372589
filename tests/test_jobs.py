"""Smoke tests for the spark-submit job entrypoints.

Each job module must import cleanly and expose ``main``; the
driver-only T4 job is executed outright. The Spark-heavy jobs are
exercised at full scale by ``benchmarks/`` — here we only check the
wiring (the table functions they delegate to are covered by
``test_tables.py``).
"""
import importlib
import sys
from pathlib import Path

import pytest

JOBS_DIR = Path(__file__).resolve().parent.parent / "jobs"

JOB_NAMES = [
    "t1_similarity",
    "t2_dup_keys",
    "t3_imbalance",
    "t4_bandwidth_estimation",
    "t5_estimation_robustness",
    "t6_nonuniform",
    "t7_scaleout",
    "t8_real_datasets",
    "t9_ec2",
]


@pytest.fixture(autouse=True)
def jobs_on_path():
    sys.path.insert(0, str(JOBS_DIR))
    yield
    sys.path.remove(str(JOBS_DIR))


class TestJobWiring:
    @pytest.mark.parametrize("name", JOB_NAMES)
    def test_importable_with_main(self, name):
        mod = importlib.import_module(name)
        assert callable(mod.main)

    def test_one_job_per_table(self):
        files = {p.stem for p in JOBS_DIR.glob("t*.py")}
        assert files == set(JOB_NAMES)

    def test_t4_runs_driver_only(self):
        mod = importlib.import_module("t4_bandwidth_estimation")
        rows = mod.main()
        assert rows and all("error_pct" in r for r in rows)

    def test_common_session_config(self, spark):
        common = importlib.import_module("_common")
        s = common.get_spark("wiring-test")  # getOrCreate -> reuses fixture
        assert s is spark
