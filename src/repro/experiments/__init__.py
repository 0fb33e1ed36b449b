"""Experiment layer: dataset presets, instance builder, harness, tables."""
from repro.experiments.instances import (
    PRESETS,
    Instance,
    build_instance,
    get_instance,
    get_eval_rr,
)
from repro.experiments.harness import RunRecord, run_rma, run_ti
from repro.experiments import tables

__all__ = [
    "PRESETS",
    "Instance",
    "build_instance",
    "get_instance",
    "get_eval_rr",
    "RunRecord",
    "run_rma",
    "run_ti",
    "tables",
]
