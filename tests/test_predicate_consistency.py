"""Cross-rendering consistency of predicates (S1): the numpy mask, the
Spark Column and the DuckDB SQL fragment must agree on the same data —
otherwise the cost model, the executor and the oracle would silently
diverge."""
import duckdb
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.pattern import Predicate

OPS = ["<", "<=", ">", ">="]


@pytest.fixture(scope="module")
def paired(spark):
    """Aligned pairs of A/B attribute values, including exact ties."""
    g = np.random.default_rng(42)
    n = 200
    a = g.integers(0, 10, n).astype(float)
    b = g.integers(0, 10, n).astype(float)
    pdf = pd.DataFrame({"A_x": a, "B_x": b})
    return pdf, spark.createDataFrame(pdf)


@pytest.mark.parametrize("op", OPS)
def test_numpy_vs_spark(paired, op):
    pdf, sdf = paired
    p = Predicate("A", "x", op, "B", "x")
    mask = p.numpy_mask(pdf["A_x"].to_numpy(), pdf["B_x"].to_numpy())
    spark_count = sdf.filter(p.spark_condition(lambda t, a: f"{t}_{a}")).count()
    assert spark_count == int(mask.sum())


@pytest.mark.parametrize("op", OPS)
def test_numpy_vs_duckdb(paired, op):
    pdf, _ = paired
    p = Predicate("A", "x", op, "B", "x")
    mask = p.numpy_mask(pdf["A_x"].to_numpy(), pdf["B_x"].to_numpy())
    con = duckdb.connect()
    try:
        con.register("t", pdf.rename(columns={"A_x": "ax", "B_x": "bx"}))
        # render via the predicate's sql() against aliased columns
        frag = p.sql(lambda t: t)  # "A.x OP B.x"
        frag = frag.replace("A.x", "ax").replace("B.x", "bx")
        n = con.execute(f"SELECT count(*) FROM t WHERE {frag}").fetchone()[0]
    finally:
        con.close()
    assert n == int(mask.sum())


@pytest.mark.parametrize("op", OPS)
def test_complement_ops_partition_ties(paired, op):
    """< and >= (resp. > and <=) partition every pair exactly."""
    pdf, _ = paired
    comp = {"<": ">=", ">": "<=", "<=": ">", ">=": "<"}[op]
    p = Predicate("A", "x", op, "B", "x")
    q = Predicate("A", "x", comp, "B", "x")
    m1 = p.numpy_mask(pdf["A_x"].to_numpy(), pdf["B_x"].to_numpy())
    m2 = q.numpy_mask(pdf["A_x"].to_numpy(), pdf["B_x"].to_numpy())
    assert (m1 ^ m2).all()
