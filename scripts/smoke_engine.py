"""Dev smoke: run the Figure-2 example through static + JOD + VDC engines."""
import os

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[4] --driver-memory 4g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.engine import DCJODEngine
from repro.core.specs import sssp_spec
from repro.core.static_ife import run_static
from repro.core.vdc import VDCEngine
from repro.graphs.generators import figure2_example
from repro.graphs.updates import Batch, apply_batch

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

g0, b1, b2 = figure2_example()
spec = sssp_spec({0: 0})

res = run_static(spark, g0.edges, spec)
print("static G0 final:\n", res.final.sort_values("v"))
print("static G0 trace:\n", res.trace.sort_values(["it", "v"]))

for Eng in (DCJODEngine, VDCEngine):
    eng = Eng(spark, spec, g0.edges)
    for i, b in enumerate((b1, b2), 1):
        cols = ["src", "dst", "label", "weight", "mult"]
        batch = Batch(pd.DataFrame(b, columns=cols))
        eng.apply_batch(batch)
        got = eng.final_states().sort_values("v")
        exp = run_static(spark, eng.edges, spec).final.sort_values("v")
        merged = got.merge(exp, on=["qid", "v"], how="outer", suffixes=("_got", "_exp"))
        ok = (merged["val_got"] == merged["val_exp"]).all() and not merged.isna().any().any()
        print(f"{Eng.__name__} after batch {i}: ok={ok}")
        if not ok:
            print(merged)
        print("  store:\n", eng.store.df.sort_values(["v", "it"]).to_string())
    if Eng is VDCEngine:
        print("  jstore rows:", len(eng.jstore))
    eng.close()
spark.stop()
