import os
os.environ["PYSPARK_SUBMIT_ARGS"] = (
    "--master local[*] --driver-memory 24g "
    "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell")
import sys
sys.path.insert(0, "/root/repo/jobs")
from _session import get_spark
from repro.core.unify import WHY
from repro.experiments.common import format_rows
from repro.experiments.quality_error import run_quality_error

spark = get_spark("t10why")
spark.sparkContext.setLogLevel("ERROR")
rows = run_quality_error(spark, "r1", WHY, 10000, [50, 100, 500], [1, 3, 5, 10],
                         unbound_why=True)
with open("/root/repo/results/t10_why_unbound.txt", "w") as f:
    print("\n== T10 r1 why unbound (ref=FULL, 10K rows) ==", file=f)
    print(format_rows(rows), file=f)
print("done")
spark.stop()
