"""Experiment drivers for the paper's evaluation tables.

One function per table; ``jobs/`` wraps them for spark-submit and
``benchmarks/`` calls them under pytest-benchmark. All run through the
Spark layer (``repro.distrib``).
"""
from repro.experiments.runner import run_search_config, timed_search
from repro.experiments.tables import (table1, table2, table2_scaled, table3,
                                      table4, table5, table6, faiss_crossover)

__all__ = ["run_search_config", "timed_search", "table1", "table2",
           "table2_scaled", "table3", "table4", "table5", "table6",
           "faiss_crossover"]
