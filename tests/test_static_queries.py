"""Static IFE (Scratch) correctness against the DuckDB oracle.

Every query-result check goes through ``repro.oracle.assert_equivalent``
with a recursive-CTE formulation of the query over the same edge table
(PageRank has no recursive-SQL form, so it is checked against an exact
numpy power-iteration reference instead — documented deviation).
"""
import numpy as np
import pandas as pd
import pytest

from repro import oracle
from repro.core import specs
from repro.core.static_ife import run_static
from repro.graphs.generators import figure2_example
from repro.rpq.automaton import q1, q2
from repro.rpq.product import accepting_vertices, product_edges, source_product_vertex
from tests.helpers import edge_frame, tiny_graph

SSSP_SQL = """
WITH RECURSIVE p(v, d) AS (
  SELECT CAST({src} AS BIGINT) AS v, CAST(0 AS DOUBLE) AS d
  UNION
  SELECT e.dst, p.d + e.weight
  FROM p JOIN edges e ON e.src = p.v
  WHERE p.d + e.weight <= {cap}
)
SELECT v, MIN(d) AS val FROM p GROUP BY v
"""

KHOP_SQL = """
WITH RECURSIVE p(v, d) AS (
  SELECT CAST({src} AS BIGINT) AS v, CAST(0 AS DOUBLE) AS d
  UNION
  SELECT e.dst, p.d + 1 FROM p JOIN edges e ON e.src = p.v WHERE p.d < {k}
)
SELECT v, MIN(d) AS val FROM p GROUP BY v
"""

WCC_SQL = """
WITH RECURSIVE verts(v) AS (SELECT DISTINCT src FROM edges UNION SELECT DISTINCT dst FROM edges),
lbl(v, l) AS (
  SELECT v, v FROM verts
  UNION
  SELECT e.dst, lbl.l FROM lbl JOIN edges e ON e.src = lbl.v
)
SELECT v, CAST(MIN(l) AS DOUBLE) AS val FROM lbl GROUP BY v
"""

REACH_SQL = """
WITH RECURSIVE r(v) AS (
  SELECT CAST({src} AS BIGINT) AS v
  UNION
  SELECT e.dst FROM r JOIN edges e ON e.src = r.v
)
SELECT v FROM r
"""


def _edges_f64(edges: pd.DataFrame) -> pd.DataFrame:
    out = edges[["src", "dst", "weight"]].copy()
    out["weight"] = out["weight"].astype(float)
    return out


def _per_qid(final: pd.DataFrame, qid: int) -> pd.DataFrame:
    return final[final["qid"] == qid][["v", "val"]].reset_index(drop=True)


class TestStaticSSSP:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_matches_oracle(self, spark, seed):
        edges = tiny_graph(seed=seed)
        src = int(edges["src"].iloc[0])
        res = run_static(spark, edges, specs.sssp_spec({0: src}))
        cap = float(edges["weight"].sum())
        oracle.assert_equivalent(
            spark.createDataFrame(_per_qid(res.final, 0)),
            SSSP_SQL.format(src=src, cap=cap),
            edges=_edges_f64(edges),
        )

    def test_figure2_distances(self, spark):
        g0, _, _ = figure2_example()
        res = run_static(spark, g0.edges, specs.sssp_spec({0: 0}))
        got = res.final.set_index("v")["val"]
        assert dict(got) == {0: 0.0, 1: 30.0, 2: 40.0, 3: 20.0, 4: 10.0}

    def test_figure2_trace_matches_table3(self, spark):
        # Table 3, G0 column (∞ rows are implicit in our sparse store).
        g0, _, _ = figure2_example()
        res = run_static(spark, g0.edges, specs.sssp_spec({0: 0}))
        trace = {(int(r.v), int(r.it)): r.val for r in res.trace.itertuples()}
        assert trace == {
            (0, 0): 0.0,
            (1, 1): 30.0, (3, 1): 20.0, (4, 1): 10.0,  # +(b,30) +(d,20) +(e,10)
            (2, 2): 40.0,                               # +(c,40)
        }
        assert res.n_iters <= 4

    def test_multi_query_vectorized(self, spark):
        edges = tiny_graph(seed=3)
        srcs = {0: int(edges["src"].iloc[0]), 1: int(edges["src"].iloc[1])}
        res = run_static(spark, edges, specs.sssp_spec(srcs))
        cap = float(edges["weight"].sum())
        for q, s in srcs.items():
            oracle.assert_equivalent(
                spark.createDataFrame(_per_qid(res.final, q)),
                SSSP_SQL.format(src=s, cap=cap),
                edges=_edges_f64(edges),
            )


class TestStaticKhop:
    @pytest.mark.parametrize("k", [1, 2, 5])
    def test_matches_oracle(self, spark, k):
        edges = tiny_graph(seed=4, weighted=False)
        src = int(edges["src"].iloc[0])
        res = run_static(spark, edges, specs.khop_spec({0: src}, k=k))
        oracle.assert_equivalent(
            spark.createDataFrame(_per_qid(res.final, 0)),
            KHOP_SQL.format(src=src, k=k),
            edges=_edges_f64(edges),
        )

    def test_respects_k_cap(self, spark):
        # a path 0->1->2->3: 2-hop must not reach 3
        edges = edge_frame([(0, 1, 1), (1, 2, 1), (2, 3, 1)])
        res = run_static(spark, edges, specs.khop_spec({0: 0}, k=2))
        assert 3 not in set(res.final["v"])


class TestStaticWCC:
    def test_matches_oracle(self, spark):
        edges = tiny_graph(seed=5)
        sym = pd.concat(
            [edges, edges.rename(columns={"src": "dst", "dst": "src"})[edges.columns]],
            ignore_index=True,
        )
        res = run_static(spark, sym, specs.wcc_spec())
        oracle.assert_equivalent(
            spark.createDataFrame(_per_qid(res.final, 0)),
            WCC_SQL,
            edges=_edges_f64(sym),
        )

    def test_two_components(self, spark):
        edges = edge_frame([(0, 1, 1), (1, 0, 1), (5, 6, 1), (6, 5, 1)])
        res = run_static(spark, edges, specs.wcc_spec())
        got = res.final.set_index("v")["val"]
        assert got[0] == got[1] == 0.0 and got[5] == got[6] == 5.0


class TestStaticRPQ:
    def test_q1_reachability_matches_oracle(self, spark):
        g = np.random.default_rng(6)
        edges = tiny_graph(seed=6, weighted=False)
        edges["label"] = g.choice(["knows", "likes"], len(edges))
        a = q1("knows")
        pe = product_edges(edges, a)
        ksub = edges[edges["label"] == "knows"]
        if not len(ksub):
            pytest.skip("no knows edges in random draw")
        src = int(ksub["src"].iloc[0])
        res = run_static(
            spark, pe, specs.rpq_spec({0: source_product_vertex(src, a)})
        )
        got_v = accepting_vertices(res.final["v"].to_numpy(), a)
        got = pd.DataFrame({"v": pd.Series(got_v, dtype="int64")})
        oracle.assert_equivalent(
            spark.createDataFrame(got),
            REACH_SQL.format(src=src),
            edges=_edges_f64(ksub),
        )

    def test_q2_semantics(self, spark):
        # 0 -likes-> 10 -replyOf-> 11 -replyOf-> 12 ; 0 -knows-> 1
        rows = [
            (0, 10, "likes"), (10, 11, "replyOf"), (11, 12, "replyOf"), (0, 1, "knows"),
        ]
        edges = pd.DataFrame(rows, columns=["src", "dst", "label"])
        edges["weight"] = 1
        a = q2("likes", "replyOf")
        pe = product_edges(edges, a)
        res = run_static(spark, pe, specs.rpq_spec({0: source_product_vertex(0, a)}))
        ans = set(accepting_vertices(res.final["v"].to_numpy(), a))
        assert ans == {10, 11, 12}  # likes ∘ replyOf* ; 1 not reachable


class TestStaticPR:
    def _numpy_pr(self, edges: pd.DataFrame, iters: int = 10) -> dict[int, float]:
        verts = np.union1d(edges["src"].unique(), edges["dst"].unique())
        idx = {v: i for i, v in enumerate(verts)}
        outdeg = edges.groupby("src").size()
        r = {v: 1.0 for v in verts}
        for _ in range(iters):
            nxt = {v: 0.15 for v in verts}
            for e in edges.itertuples():
                nxt[e.dst] += 0.85 * r[e.src] / outdeg[e.src]
            r = nxt
        return r

    def test_matches_numpy_reference(self, spark):
        edges = tiny_graph(seed=7)
        res = run_static(spark, edges, specs.pr_spec())
        ref = self._numpy_pr(edges)
        got = res.final.set_index("v")["val"]
        for v, x in ref.items():
            assert got[v] == pytest.approx(x, abs=1e-6)

    def test_fixed_iterations(self, spark):
        edges = tiny_graph(seed=8)
        res = run_static(spark, edges, specs.pr_spec(iters=3))
        assert res.n_iters <= 3


class TestStaticConvergence:
    def test_cycle_converges(self, spark):
        edges = edge_frame([(0, 1, 1), (1, 2, 1), (2, 0, 1)])
        res = run_static(spark, edges, specs.sssp_spec({0: 0}))
        assert dict(res.final.set_index("v")["val"]) == {0: 0.0, 1: 1.0, 2: 2.0}

    def test_unreachable_absent(self, spark):
        edges = edge_frame([(0, 1, 1), (5, 6, 1)])
        res = run_static(spark, edges, specs.sssp_spec({0: 0}))
        assert set(res.final["v"]) == {0, 1}
