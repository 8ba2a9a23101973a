"""Workload substrate: predicates, queries, templates, stream generators.

The paper evaluates OREO on template-segmented query streams over three
denormalized tables (TPC-H, TPC-DS, Telemetry). This package provides the
query model (``queries``), per-dataset synthetic schemas and template sets
(``datasets``, ``templates``), and the state-machine stream generator
(``generator``).
"""
from repro.workload.queries import InPredicate, Query, RangePredicate  # noqa: F401
from repro.workload.generator import Workload, generate_workload  # noqa: F401
