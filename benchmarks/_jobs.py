"""Import the job modules (jobs/ is not a package) for the benchmarks."""
import importlib.util
import sys
from pathlib import Path

_JOBS = Path(__file__).resolve().parent.parent / "jobs"


def load_job(name: str):
    """Load ``jobs/<name>.py`` as a module and return it."""
    spec = importlib.util.spec_from_file_location(name, _JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    sys.modules[name] = mod
    spec.loader.exec_module(mod)
    return mod
