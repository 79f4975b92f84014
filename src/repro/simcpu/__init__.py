"""Simulated 96-core shared-memory machine executing the peeling
algorithms: the hardware substrate the paper evaluates on, which this
container does not have. The simulator *executes* every algorithm on
real graph data (coreness, subround structure, contention and bucket
operations are measured, not modeled) and converts measured events to
time via the work-span + burdened-span cost model the paper itself
uses for analysis."""

from repro.simcpu.machine import MachineConfig  # noqa: F401
from repro.simcpu.metrics import RunMetrics  # noqa: F401
from repro.simcpu.engine import AlgoConfig, run_kcore  # noqa: F401
