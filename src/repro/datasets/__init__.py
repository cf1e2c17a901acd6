"""Synthetic stand-ins for the paper's evaluation datasets (see DESIGN.md)."""
from repro.datasets.airbnb import f_airbnb, s_airbnb  # noqa: F401
from repro.datasets.crimes import crimes  # noqa: F401
from repro.datasets.dblp import dblp  # noqa: F401
from repro.datasets.graph_r import graph_r  # noqa: F401
from repro.datasets.license import license_db  # noqa: F401
from repro.datasets.movies import movies  # noqa: F401
from repro.datasets.synthetic_joins import chain_db, star_db  # noqa: F401
from repro.datasets.tpch import tpch_db  # noqa: F401
from repro.datasets.witness import witness_db  # noqa: F401
