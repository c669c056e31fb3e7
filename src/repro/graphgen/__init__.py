"""Synthetic graph substrate.

The paper evaluates on 6 public KONECT graphs; the container has no
network access, so :mod:`repro.graphgen.datasets` provides deterministic
synthetic stand-ins with matched |V|, |E| and family-appropriate degree
structure, and :mod:`repro.graphgen.toy` rebuilds the 14-node running
example of Figures 1-3 (see DESIGN.md substitutions 5 and 6).
"""
from .datasets import DATASETS, dataset_edges  # noqa: F401
from .generators import (  # noqa: F401
    erdos_renyi,
    powerlaw_configuration,
    preferential_attachment,
    rmat,
)
from .toy import toy_edges  # noqa: F401
