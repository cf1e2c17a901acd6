"""Provenance capture: annotated derivations for why and why-not questions."""
from repro.provenance.annotate import (  # noqa: F401
    annotate_goals,
    anti_join_existing,
    filter_result_to_head,
    goal_column_names,
)
from repro.provenance.why import why_derivations, why_provenance  # noqa: F401
from repro.provenance.whynot_full import (  # noqa: F401
    all_valuations,
    whynot_full,
    whynot_full_rule,
)
