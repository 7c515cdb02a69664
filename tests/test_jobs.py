"""Jobs: each spark-submit entrypoint imports cleanly and exposes main."""
import importlib.util
import pathlib

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def _load(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    import sys

    sys.path.insert(0, str(JOBS))
    try:
        spec.loader.exec_module(mod)
    finally:
        sys.path.pop(0)
    return mod


@pytest.mark.parametrize(
    "name",
    ["table2_datasets", "table4_t2_t4", "table5_t5", "table6_t1_t3"],
)
def test_job_importable_with_main(name):
    mod = _load(name)
    assert callable(mod.main)


def test_session_helper_returns_running_spark(spark):
    # when a session exists, get_spark returns it (no second JVM)
    mod = _load("_session")
    s = mod.get_spark()
    assert s is spark
