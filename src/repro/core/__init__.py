"""Core of the Data-Juicer reproduction.

Contains the unified data representation (:mod:`repro.core.schema`), the
operator base classes (:mod:`repro.core.base`), the OP registry
(:mod:`repro.core.registry`), the recipe executor
(:mod:`repro.core.pipeline`) with OP fusion/reordering
(:mod:`repro.core.fusion`), and the feedback-loop tooling: Analyzer,
Tracer, cache/checkpoint manager, HPO, and samplers.
"""
from repro.core.base import Deduplicator, Filter, Formatter, Mapper, Op  # noqa: F401
from repro.core.registry import OP_REGISTRY, get_op, register  # noqa: F401
