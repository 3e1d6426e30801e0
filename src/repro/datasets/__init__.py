"""Datasets: the paper's running example (Figure 1), the Theorem 3.3
hardness construction, and synthetic substitutes for the three real-world
evaluation datasets (COMPAS / Student / German Credit — see DESIGN.md §3)."""

from repro.datasets.base import RankedDataset  # noqa: F401
from repro.datasets.paper_example import paper_example  # noqa: F401
from repro.datasets.hardness import hardness_construction  # noqa: F401
from repro.datasets.student import student  # noqa: F401
from repro.datasets.compas import compas  # noqa: F401
from repro.datasets.german import german_credit  # noqa: F401
