"""The IFE ExpandFrontier operator pair (Fig. 1) as Spark DataFrame jobs.

Each call is one Catalyst job: the Join operator (frontier ⋈ edges ⋈
neighbour states) followed by the aggregation operator (groupBy + min/sum),
exactly the dataflow in Fig. 1b. Three entry points:

* :func:`aggregate_at` — recomputation-style: for each frontier vertex v,
  ``D[v] = agg(base(v), { f(state_w, e) : e=(w,v) })``. Used by DC^JOD
  recomputation, by dropped-difference recomputation, and by PageRank.
* :func:`push_messages` — frontier-style: messages from changed vertices to
  their out-neighbours, pre-aggregated per destination. Used by the static
  (Scratch) engine and by VDC's δJ maintenance. For min-aggregators the two
  styles produce identical traces (monotone-relaxation equivalence; see
  DESIGN.md §5).
* :func:`aggregate_msgs` — aggregation over already-materialized messages
  (VDC reassembling J from its δJ store).

All inputs/outputs at this boundary are pandas frames (the driver-side
arrangement); the join/aggregate work itself is Spark SQL. Broadcast joins
stay disabled by the session fixture, so the shuffle path is exercised.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.specs import QuerySpec

_STATE_SCHEMA = T.StructType(
    [
        T.StructField("qid", T.LongType()),
        T.StructField("w", T.LongType()),
        T.StructField("val", T.DoubleType()),
        T.StructField("aux", T.DoubleType()),
    ]
)
_FRONTIER_SCHEMA = T.StructType(
    [T.StructField("qid", T.LongType()), T.StructField("v", T.LongType())]
)
_MSG_SCHEMA = T.StructType(
    [
        T.StructField("qid", T.LongType()),
        T.StructField("v", T.LongType()),
        T.StructField("val", T.DoubleType()),
    ]
)

EDGE_SPARK_SCHEMA = T.StructType(
    [
        T.StructField("src", T.LongType()),
        T.StructField("dst", T.LongType()),
        T.StructField("weight", T.DoubleType()),
    ]
)


def tune(spark: SparkSession) -> None:
    """Size shuffles for the many small iterative jobs this dataflow issues.

    The session default (64 partitions) is right for one big scan; an IFE
    maintenance pass issues hundreds of joins over frames of a few thousand
    rows, where per-partition scheduling overhead dominates. 8 partitions
    keeps the shuffle path exercised (broadcast joins stay disabled) without
    drowning in task latency.
    """
    spark.conf.set("spark.sql.shuffle.partitions", "8")


def edges_to_spark(spark: SparkSession, edges: pd.DataFrame) -> DataFrame:
    """Lift the current graph version's edges into a (persisted) Spark DF."""
    pdf = pd.DataFrame(
        {
            "src": edges["src"].astype(np.int64),
            "dst": edges["dst"].astype(np.int64),
            "weight": edges["weight"].astype(np.float64),
        }
    )
    return spark.createDataFrame(pdf, schema=EDGE_SPARK_SCHEMA).persist()


def _message_col(spec: QuerySpec):
    """The Join operator's message expression f(state_w, edge)."""
    if spec.kind == "sssp":
        return F.col("val") + F.col("weight")
    if spec.kind in ("khop", "rpq"):
        return F.col("val") + F.lit(1.0)
    if spec.kind == "wcc":
        return F.col("val")
    if spec.kind == "pr":
        return F.lit(0.85) * F.col("val") / F.col("aux")
    raise ValueError(spec.kind)


def _agg_expr(spec: QuerySpec):
    return F.min("mval") if spec.agg == "min" else F.sum("mval")


def _states_df(spark: SparkSession, states: pd.DataFrame) -> DataFrame:
    pdf = pd.DataFrame(
        {
            "qid": states["qid"].astype(np.int64),
            "w": states["w"].astype(np.int64),
            "val": states["val"].astype(np.float64),
            "aux": (
                states["aux"].astype(np.float64)
                if "aux" in states.columns
                else np.ones(len(states))
            ),
        }
    )
    return spark.createDataFrame(pdf, schema=_STATE_SCHEMA)


def aggregate_at(
    spark: SparkSession,
    edges_sp: DataFrame,
    frontier: pd.DataFrame,
    states: pd.DataFrame,
    base: pd.DataFrame,
    spec: QuerySpec,
) -> pd.DataFrame:
    """Recompute the aggregation for every frontier vertex.

    frontier: (qid, v) — vertices whose aggregation reruns.
    states:   (qid, w, val[, aux]) — in-neighbour states at the previous
              iteration (aux = sender out-degree for PR).
    base:     (qid, v, val) — base contributions for frontier vertices.

    Returns (qid, v, val). Frontier vertices with no messages and no base
    are absent (= unreachable / +inf to the caller).
    """
    if not len(frontier):
        return pd.DataFrame({"qid": [], "v": [], "val": []})
    fr = spark.createDataFrame(
        pd.DataFrame(
            {"qid": frontier["qid"].astype(np.int64), "v": frontier["v"].astype(np.int64)}
        ),
        schema=_FRONTIER_SCHEMA,
    )
    parts = []
    if len(states):
        st = _states_df(spark, states)
        msgs = (
            edges_sp.join(fr, on=edges_sp["dst"] == fr["v"], how="inner")
            .join(st, on=(edges_sp["src"] == st["w"]) & (fr["qid"] == st["qid"]), how="inner")
            .select(fr["qid"].alias("qid"), fr["v"].alias("v"), _message_col(spec).alias("mval"))
        )
        parts.append(msgs)
    if len(base):
        bs = spark.createDataFrame(
            pd.DataFrame(
                {
                    "qid": base["qid"].astype(np.int64),
                    "v": base["v"].astype(np.int64),
                    "val": base["val"].astype(np.float64),
                }
            ),
            schema=_MSG_SCHEMA,
        ).select("qid", "v", F.col("val").alias("mval"))
        parts.append(bs)
    if not parts:
        return pd.DataFrame({"qid": [], "v": [], "val": []})
    allm = parts[0]
    for p in parts[1:]:
        allm = allm.unionByName(p)
    out = allm.groupBy("qid", "v").agg(_agg_expr(spec).alias("val"))
    return out.toPandas()


def push_messages(
    spark: SparkSession,
    edges_sp: DataFrame,
    changed: pd.DataFrame,
    spec: QuerySpec,
) -> pd.DataFrame:
    """Messages from changed vertices to out-neighbours, agg'd per target.

    changed: (qid, w, val[, aux]) — the frontier's new states.
    Returns (qid, v, val): per-destination aggregated incoming messages.
    """
    if not len(changed):
        return pd.DataFrame({"qid": [], "v": [], "val": []})
    st = _states_df(spark, changed)
    msgs = edges_sp.join(st, on=edges_sp["src"] == st["w"], how="inner").select(
        st["qid"].alias("qid"), edges_sp["dst"].alias("v"), _message_col(spec).alias("mval")
    )
    out = msgs.groupBy("qid", "v").agg(_agg_expr(spec).alias("val"))
    return out.toPandas()


def raw_messages(
    spark: SparkSession,
    edges_sp: DataFrame,
    changed: pd.DataFrame,
    spec: QuerySpec,
    *,
    carry_it: bool = False,
) -> pd.DataFrame:
    """Un-aggregated Join output: one message row per (changed w, out-edge).

    VDC materializes these as its δJ difference store — precisely the
    collection the JOD optimization drops. Returns (qid, v, w, val), plus
    the sender's ``it`` column when ``carry_it`` (for bulk δJ builds).
    """
    cols = {"qid": [], "v": [], "w": [], "val": []}
    if carry_it:
        cols["it"] = []
    if not len(changed):
        return pd.DataFrame(cols)
    schema = _STATE_SCHEMA
    pdf = pd.DataFrame(
        {
            "qid": changed["qid"].astype(np.int64),
            "w": changed["w"].astype(np.int64),
            "val": changed["val"].astype(np.float64),
            "aux": (
                changed["aux"].astype(np.float64)
                if "aux" in changed.columns
                else np.ones(len(changed))
            ),
        }
    )
    if carry_it:
        pdf["it"] = changed["it"].astype(np.int64)
        schema = T.StructType(list(_STATE_SCHEMA.fields) + [T.StructField("it", T.LongType())])
    st = spark.createDataFrame(pdf, schema=schema)
    sel = [
        st["qid"].alias("qid"),
        edges_sp["dst"].alias("v"),
        st["w"].alias("w"),
        _message_col(spec).alias("val"),
    ]
    if carry_it:
        sel.append(st["it"].alias("it"))
    msgs = edges_sp.join(st, on=edges_sp["src"] == st["w"], how="inner").select(*sel)
    # Parallel edges from the same sender combine under the aggregator
    # (min/sum are associative), so the δJ trace stays keyed by sender.
    keys = ["qid", "v", "w"] + (["it"] if carry_it else [])
    agg = F.min("val") if spec.agg == "min" else F.sum("val")
    msgs = msgs.groupBy(*keys).agg(agg.alias("val"))
    return msgs.toPandas()


def aggregate_msgs(
    spark: SparkSession,
    msgs: pd.DataFrame,
    base: pd.DataFrame,
    spec: QuerySpec,
) -> pd.DataFrame:
    """Aggregate pre-materialized messages (VDC's reassembled J) plus base."""
    frames = []
    for f in (msgs, base):
        if len(f):
            frames.append(
                pd.DataFrame(
                    {
                        "qid": f["qid"].astype(np.int64),
                        "v": f["v"].astype(np.int64),
                        "val": f["val"].astype(np.float64),
                    }
                )
            )
    if not frames:
        return pd.DataFrame({"qid": [], "v": [], "val": []})
    allm = spark.createDataFrame(pd.concat(frames, ignore_index=True), schema=_MSG_SCHEMA)
    out = allm.select("qid", "v", F.col("val").alias("mval")).groupBy("qid", "v").agg(
        _agg_expr(spec).alias("val")
    )
    return out.toPandas()
