"""The paper's running example (Figure 1): persons with two address relations.

Query (Example 4):
    N^R_{name→nList}( π_{name,city}( σ_{year≥2019}( F^I_{address2}(person) ) ) )

Why-not question (Example 5/8): ⟨city: "NY", nList: {{?, *}}⟩ — why is NY
missing from the result? Expected explanations (Example 19):
``{σ}`` (first) and ``{F, σ}`` (via the address1 schema alternative).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import types as T

from ..core import algebra as A
from ..core import nip as N
from ..core.exprs import cmp

ADDR = T.ArrayType(
    T.StructType(
        [T.StructField("city", T.StringType()), T.StructField("year", T.IntegerType())]
    )
)
SCHEMA = T.StructType(
    [
        T.StructField("name", T.StringType()),
        T.StructField("address1", ADDR),
        T.StructField("address2", ADDR),
    ]
)

ROWS = [
    (
        "Peter",
        [("NY", 2010), ("LA", 2019), ("LV", 2017)],
        [("LA", 2010), ("SF", 2018)],
    ),
    ("Sue", [("LA", 2019), ("NY", 2018)], [("LA", 2019), ("NY", 2018)]),
]


def person(spark: SparkSession):
    return spark.createDataFrame(ROWS, SCHEMA)


def db(spark: SparkSession) -> dict:
    return {"person": person(spark)}


def query() -> A.Op:
    f = A.FlattenRel(A.TableAccess("person"), "address2")
    s = A.Select(f, cmp("year", ">=", 2019))
    p = A.Project(s, [("name", "name"), ("city", "city")])
    n = A.NestRel(p, ["name"], "nList")
    return n


def whynot_nip() -> N.Tup:
    return N.Tup({"city": N.Val("NY"), "nList": N.Bag([N.WILD], star=True)})


def alternatives() -> dict[str, list[str]]:
    """Attribute alternatives of Example 13 (op-level: the flattened attr)."""
    return {"address2": ["address1"]}
