"""2-cycle detection vs the DuckDB oracle."""
import pandas as pd
import pytest

from repro.graph.schema import edges_df
from repro.graph.two_cycles import reciprocity, two_cycle_pairs
from repro.graphgen.models import powerlaw_digraph
from repro.oracle import assert_equivalent

SQL = """
SELECT a.src AS u, a.dst AS v
FROM t a JOIN t b ON a.src = b.dst AND a.dst = b.src
WHERE a.src < a.dst
"""


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("rec", [0.0, 0.3, 0.7])
def test_pairs_vs_oracle(spark, seed, rec):
    pdf = powerlaw_digraph(30, 140, reciprocity=rec, seed=seed)
    got = two_cycle_pairs(edges_df(spark, pdf))
    assert_equivalent(got, SQL, t=pdf)


def test_reciprocity_value(spark):
    pdf = pd.DataFrame({"src": [0, 1, 1, 2], "dst": [1, 0, 2, 3]})
    e = edges_df(spark, pdf)
    assert reciprocity(e) == pytest.approx(0.5)  # 2 of 4 edges mutual


def test_reciprocity_monotone_in_generator_knob(spark):
    lo = reciprocity(edges_df(spark, powerlaw_digraph(
        200, 1500, reciprocity=0.05, seed=1)))
    hi = reciprocity(edges_df(spark, powerlaw_digraph(
        200, 1500, reciprocity=0.5, seed=1)))
    assert hi > lo


def test_empty(spark):
    e = spark.createDataFrame([], "src BIGINT, dst BIGINT")
    assert two_cycle_pairs(e).count() == 0
    assert reciprocity(e) == 0.0
