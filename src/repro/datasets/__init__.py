"""Synthetic data-series collections standing in for the paper's benchmark.

``generators`` builds raw series matrices with controlled spectral
profiles; ``registry`` maps the paper's 17 dataset names (Table I) to
scaled synthetic analogs and provides the UCR-archive-like suite used
by the TLB ablation (Tables V/VI).
"""
from repro.datasets.registry import REGISTRY, make_dataset, make_queries, ucr_like

__all__ = ["REGISTRY", "make_dataset", "make_queries", "ucr_like"]
