"""Benchmark helpers: load a job module by name (jobs/ is a scripts
directory, not a package)."""
import importlib.util
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")


@pytest.fixture(scope="session")
def load_job():
    def _load(name):
        if name in sys.modules:
            return sys.modules[name]
        spec = importlib.util.spec_from_file_location(
            name, os.path.join(JOBS_DIR, f"{name}.py")
        )
        mod = importlib.util.module_from_spec(spec)
        sys.modules[name] = mod
        spec.loader.exec_module(mod)
        return mod

    return _load
