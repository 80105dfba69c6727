"""Built-in operator pool: Formatters, Mappers, Filters, Deduplicators.

Importing this package registers all built-in OPs (>50) into
``repro.core.registry.OP_REGISTRY``.
"""
from repro.ops import dedup, filters, formatters, mappers  # noqa: F401
