"""Degree aggregations vs the DuckDB oracle."""
import pytest

from repro.graph.degrees import degrees
from repro.oracle import assert_equivalent
from repro.graphgen.models import powerlaw_digraph, uniform_digraph
from repro.graph.schema import edges_df

SQL = """
WITH o AS (SELECT src AS v, COUNT(*) AS out_deg FROM t GROUP BY src),
     i AS (SELECT dst AS v, COUNT(*) AS in_deg FROM t GROUP BY dst)
SELECT COALESCE(o.v, i.v) AS v,
       COALESCE(out_deg, 0) AS out_deg,
       COALESCE(in_deg, 0) AS in_deg,
       COALESCE(out_deg, 0) + COALESCE(in_deg, 0) AS deg
FROM o FULL OUTER JOIN i ON o.v = i.v
"""


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("gen", [uniform_digraph, powerlaw_digraph])
def test_degrees_vs_oracle(spark, seed, gen):
    pdf = gen(30, 120, reciprocity=0.3, seed=seed)
    got = degrees(edges_df(spark, pdf))
    assert_equivalent(got, SQL, t=pdf)


def test_degree_sums(spark):
    pdf = uniform_digraph(25, 90, seed=9)
    d = degrees(edges_df(spark, pdf)).toPandas()
    assert d.out_deg.sum() == d.in_deg.sum() == len(pdf)
