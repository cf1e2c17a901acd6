"""Driver: run every table harness at reproduction scale, save outputs."""
import sys, time
sys.path.insert(0, "/root/repo/jobs")
from _session import get_spark
from repro.core.unify import WHY, WHYNOT
from repro.experiments.common import format_rows
from repro.experiments.perf_scaling import run_perf_scaling
from repro.experiments.topk_runtime import run_topk_runtime
from repro.experiments.query_complexity import (
    run_bound_vars, run_dblp_hops, run_join_scaling, run_tpch_bound_vars)
from repro.experiments.quality_error import run_quality_error
from repro.experiments.completeness import run_completeness
from repro.experiments.comparison import (
    run_artemis_comparison, run_single_derivation_comparison)

spark = get_spark("run_all")
spark.sparkContext.setLogLevel("ERROR")
out = open("/root/repo/results/all_tables.txt", "w", buffering=1)

def emit(title, rows):
    print(f"\n== {title} ==", file=out)
    print(format_rows(rows), file=out)
    print(f"done: {title}", flush=True)

t0 = time.time()
# ---- T6 ----
for qtype in (WHY, WHYNOT):
    emit(f"T6 r1 {qtype}",
         run_perf_scaling(spark, "r1", qtype, [1000, 10000, 100000],
                          [50, 1000], k=3, include_full=True))
for q in ("r3", "r4"):
    for qtype in (WHY, WHYNOT):
        emit(f"T6 {q} {qtype}",
             run_perf_scaling(spark, q, qtype, [1000, 5000], [50, 1000], k=3))
print("T6 elapsed", time.time()-t0, flush=True)

# ---- T7 ----
for qtype in (WHY, WHYNOT):
    emit(f"T7 r2 {qtype}",
         run_perf_scaling(spark, "r2", qtype, [1000, 10000, 100000],
                          [50, 1000], k=3))
for q in ("r11", "r12"):
    for qtype in (WHY, WHYNOT):
        emit(f"T7 {q} {qtype}",
             run_perf_scaling(spark, q, qtype, [1000, 5000], [50, 1000], k=3))
print("T7 elapsed", time.time()-t0, flush=True)

# ---- T8 ----
emit("T8 r1 whynot (20K rows, S1K)",
     run_topk_runtime(spark, "r1", WHYNOT, 20000, 1000, [1, 3, 5, 10]))
emit("T8 r4 whynot (2K movies, S300)",
     run_topk_runtime(spark, "r4", WHYNOT, 2000, 300, [1, 3, 5, 10]))
print("T8 elapsed", time.time()-t0, flush=True)

# ---- T9 ----
for shape in ("chain", "star"):
    emit(f"T9 {shape} joins",
         run_join_scaling(spark, shape, [2, 4, 6], n_rows=2000, n_s=100))
emit("T9 chain 6 joins, bound vars",
     run_bound_vars(spark, "chain", 6, [0, 2, 4, 6], n_rows=2000, n_s=100))
emit("T9 star 5 joins, bound vars",
     run_bound_vars(spark, "star", 5, [0, 2, 4], n_rows=2000, n_s=100))
emit("T9 dblp hops", run_dblp_hops(spark, [2, 3, 4], n_edges=2000, n_s=100))
emit("T9 tpch r10 bound vars",
     run_tpch_bound_vars(spark, [0, 4, 8, 12], n_rows=1500, n_s=100))
print("T9 elapsed", time.time()-t0, flush=True)

# ---- T10 ----
emit("T10 r1 why (ref=FULL)",
     run_quality_error(spark, "r1", WHY, 2000, [50, 100, 500], [1, 3, 5, 10]))
emit("T10 r6 whynot (ref=S2000)",
     run_quality_error(spark, "r6", WHYNOT, 2000, [50, 100, 500],
                       [1, 3, 5, 10], reference_n_s=2000))
print("T10 elapsed", time.time()-t0, flush=True)

# ---- T11 ----
for qtype in (WHY, WHYNOT):
    emit(f"T11 completeness {qtype}",
         run_completeness(spark, ["r1", "r2", "r3", "r5", "r6"], qtype,
                          2000, [1, 3, 5, 10], n_s=300))
print("T11 elapsed", time.time()-t0, flush=True)

# ---- T12 ----
emit("T12a artemis", run_artemis_comparison(spark, [200, 500, 1400, 5000, 22000]))
emit("T12b single-derivation",
     run_single_derivation_comparison(spark, [1000, 10000, 100000]))
print("TOTAL elapsed", time.time()-t0, flush=True)
out.close()
spark.stop()
