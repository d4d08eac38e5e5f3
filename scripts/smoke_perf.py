"""Dev probe: per-batch maintenance cost at benchmark scale."""
import os
import time

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[8] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
import numpy as np
from pyspark.sql import SparkSession

from repro.core.engine import DCJODEngine
from repro.core.specs import sssp_spec
from repro.core.static_ife import run_static
from repro.graphs.generators import skitter_like
from repro.graphs.updates import split_stream, to_batches

spark = (
    SparkSession.builder.appName("perf")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

g = skitter_like(scale=1.0)
init, stream = split_stream(g)
batches = to_batches(init, stream, n_batches=10, batch_size=1)
rng = np.random.default_rng(0)
verts = np.union1d(init["src"].unique(), init["dst"].unique())
sources = {q: int(rng.choice(verts)) for q in range(10)}
spec = sssp_spec(sources)

t0 = time.perf_counter()
res = run_static(spark, init, spec)
print(f"static: {time.perf_counter()-t0:.1f}s iters={res.n_iters} trace={len(res.trace)}")

t0 = time.perf_counter()
eng = DCJODEngine(spark, spec, init)
print(f"engine init: {time.perf_counter()-t0:.1f}s diffs={eng.store.n_diffs()}")
for b in batches[:5]:
    m = eng.apply_batch(b)
    print(f"batch: {m['batch_s']:.2f}s sched={m['n_sched']} changed={m['n_changed']}")
print("mem:", eng.memory_bytes())
eng.close()
spark.stop()
