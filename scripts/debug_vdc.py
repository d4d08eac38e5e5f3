"""Dev: sweep seeds to find a VDC vs static divergence, then dump state."""
import os
import sys

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[4] --driver-memory 4g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

from repro.core import specs
from repro.core.static_ife import run_static
from repro.core.vdc import VDCEngine
from tests.helpers import random_batches, tiny_graph

spark = (
    SparkSession.builder.appName("dbg").config("spark.sql.shuffle.partitions", "4").getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

delete_prob = float(sys.argv[1]) if len(sys.argv) > 1 else 0.0
for seed in range(30):
    edges = tiny_graph(14, 36, seed=seed, weighted=True)
    spec = specs.sssp_spec({0: int(edges["src"].iloc[0]), 1: int(edges["src"].iloc[1])})
    batches = random_batches(edges, 4, delete_prob=delete_prob, n_vertices=14, seed=seed)
    eng = VDCEngine(spark, spec, edges)
    bad_found = False
    for bi, b in enumerate(batches):
        eng.apply_batch(b)
        exp = run_static(spark, eng.edges, spec).final
        got = eng.final_states()
        m = got.merge(exp, on=["qid", "v"], how="outer", suffixes=("_got", "_exp"))
        bad = m[(m["val_got"] != m["val_exp"]) | m["val_got"].isna() | m["val_exp"].isna()]
        if len(bad):
            print(f"DIVERGENCE seed={seed} batch={bi}")
            print("change:", b.changes.to_dict("records"))
            print(bad)
            print("store:\n", eng.store.df.sort_values(["qid", "v", "it"]).to_string())
            print("jstore:\n", eng.jstore.sort_values(["qid", "v", "it", "w"]).to_string())
            bad_found = True
            break
    eng.close()
    if bad_found:
        break
    print(f"seed {seed} ok")
spark.stop()
