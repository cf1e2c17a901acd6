"""T6/T7 (Figs. 6–7): per-phase summarization runtime vs dataset size ×
sample size, for why and why-not questions.

Each row reports the paper's bar chart quantities: dataset size (#rows
of the primary relation), provenance size (#derivations — exact for
why, the derivation-space product for why-not), and per-phase runtimes
(sampling, pattern generation, metric computation, top-k). ``FULL``
rows use the complete provenance as summarization input; like the
paper, FULL why-not is infeasible beyond toy sizes and is reported as a
timeout (None).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.unify import WHY, WHYNOT, PQuestion
from repro.engine.catalog import Catalog
from repro.experiments.common import whynot_space
from repro.experiments.queries import QUERIES
from repro.summarize.pipeline import summarize


def run_perf_scaling(
    spark: SparkSession,
    query: str,
    qtype: str,
    sizes: list[int],
    sample_sizes: list[int],
    k: int = 3,
    include_full: bool = False,
    full_budget: int = 200_000,
    seed: int = 0,
) -> list[dict]:
    """One row per (dataset size, sample size [or FULL])."""
    spec = QUERIES[query]
    rows: list[dict] = []
    for n in sizes:
        db = spec.build_db(spark, n, seed)
        catalog = Catalog(spark, db)
        program = spec.program()
        t = (
            spec.why_ptuple(catalog, program)
            if qtype == WHY
            else spec.whynot_ptuple(catalog, program)
        )
        question = PQuestion(t, qtype)
        prov_size = (
            whynot_space(catalog, program, t) if qtype == WHYNOT else None
        )
        configs: list[tuple[str, int | None]] = [
            (f"S{ns}", ns) for ns in sample_sizes
        ]
        if include_full:
            configs.append(("FULL", None))
        for label, ns in configs:
            row = {
                "query": query,
                "qtype": qtype,
                "n_rows": n,
                "prov_size": prov_size,
                "sample": label,
            }
            try:
                if ns is None:
                    if qtype == WHY:
                        # FULL why: quadratic LCA input — apply the same
                        # budget the paper's 30-minute timeout imposes
                        from repro.provenance.why import why_provenance

                        n_prov = sum(
                            df.count()
                            for _, df in why_provenance(catalog, program, t)
                        )
                        if n_prov > max(1, int(full_budget ** 0.5) * 8):
                            raise ValueError("FULL why over budget")
                    s = summarize(
                        catalog, program, question, k=k, n_s=1 << 30,
                        seed=seed, use_full=(qtype == WHYNOT),
                        max_full_derivations=full_budget,
                    )
                else:
                    s = summarize(
                        catalog, program, question, k=k, n_s=ns, seed=seed
                    )
            except ValueError:
                # FULL enumeration over budget — the paper's timed-out bar
                row.update(
                    t_sample=None, t_pattern=None, t_metrics=None,
                    t_topk=None, t_total=None, completeness=None, score=None,
                )
                rows.append(row)
                continue
            row.update(
                t_sample=s.timings["sample"],
                t_pattern=s.timings["pattern_gen"],
                t_metrics=s.timings["metrics"],
                t_topk=s.timings["topk"],
                t_total=s.timings["total"],
                completeness=s.completeness,
                score=s.score,
            )
            rows.append(row)
    return rows
