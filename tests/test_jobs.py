"""The spark-submit entrypoints must at least import and expose main()."""
import importlib.util
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")
JOB_FILES = sorted(
    f for f in os.listdir(JOBS_DIR) if f.endswith(".py") and not f.startswith("_")
)


@pytest.mark.parametrize("fname", JOB_FILES)
def test_job_module_has_main(fname):
    sys.path.insert(0, JOBS_DIR)
    try:
        spec = importlib.util.spec_from_file_location(
            fname[:-3], os.path.join(JOBS_DIR, fname)
        )
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        assert callable(mod.main)
    finally:
        sys.path.remove(JOBS_DIR)


def test_every_design_table_has_a_job():
    names = {f[:-3].split("_")[0] for f in JOB_FILES}
    for prefix in ("table1", "table4", "table5", "table6", "table7", "table8",
                   "fig9", "fig15", "fig17", "fig19", "fig20"):
        assert any(f.startswith(prefix) for f in JOB_FILES), prefix
