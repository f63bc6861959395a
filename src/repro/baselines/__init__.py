"""Comparison policies from the paper's evaluation (Section 5.1):
Exact, CMQS [Lin'04], AM [Arasu-Manku'04], Random [Luo'16], Moment sketch.

Each is reimplemented from the cited papers' structure at the level of
detail the comparison depends on (see DESIGN.md section 4) and speaks the
same :class:`repro.streams.runner.QuantilePolicy` protocol as QLOVE.
"""
from repro.baselines.exact import ExactPolicy  # noqa: F401
from repro.baselines.cmqs import CmqsPolicy  # noqa: F401
from repro.baselines.am import AmPolicy  # noqa: F401
from repro.baselines.random_sampling import RandomPolicy  # noqa: F401
from repro.baselines.moment import MomentPolicy  # noqa: F401
