"""Trill-substitute execution substrate: window specs and a single-threaded
incremental-operator runner (see DESIGN.md section 2)."""
from repro.streams.windows import WindowSpec  # noqa: F401
from repro.streams.runner import run_policy, Evaluation  # noqa: F401
