"""Comparison baselines of Sec. 9.3: single-derivation and Artemis-like."""
from repro.baselines.artemis import ArtemisExplanation, artemis_explain  # noqa: F401
from repro.baselines.single_derivation import single_derivation  # noqa: F401
