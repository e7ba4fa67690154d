"""The job entrypoints must at least import and expose a main()."""
import importlib.util
import pathlib
import sys

import pytest

JOBS = pathlib.Path(__file__).resolve().parents[1] / "jobs"


def _load(name: str):
    # spark-submit runs jobs with the jobs/ directory on sys.path (for
    # the shared `_common` bootstrap); emulate that here
    sys.path.insert(0, str(JOBS))
    try:
        spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.remove(str(JOBS))


@pytest.mark.parametrize(
    "name", ["table3", "table4", "table5", "table6", "run_tdh", "assign_tasks"]
)
def test_job_importable_with_main(name):
    mod = _load(name)
    assert callable(mod.main)
