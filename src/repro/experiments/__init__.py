"""Experiment harnesses T1–T7: one module per evaluation table.

The paper (an industrial systems paper) has no numbered evaluation tables;
its evaluation is the quantitative claims of §3/§5/§6. Each module here
reproduces one of those claims end to end: it generates the workload, runs
the system (and the baseline where one exists), and prints a table with the
paper's reported numbers next to ours. ``EXPERIMENTS.md`` holds the recorded
comparison; ``benchmarks/`` and ``jobs/`` are thin wrappers over these
modules.
"""
from repro.experiments import t1_incremental_vs_full  # noqa: F401
from repro.experiments import t2_refresh_actions  # noqa: F401
from repro.experiments import t3_operator_coverage  # noqa: F401
from repro.experiments import t4_scheduler  # noqa: F401
from repro.experiments import t5_isolation  # noqa: F401
from repro.experiments import t6_population  # noqa: F401
from repro.experiments import t7_streaming  # noqa: F401
