"""DBLP scenarios D1–D5 (Tables 4/10) on a synthetic DBLP-like dataset.

The paper runs on 100–500 GB DBLP crawls; the explanations depend only on
the touched attributes and their null/containment statistics, which we
reproduce synthetically (DESIGN.md, dataset substitutions): publication
records with nested title variants (``title.bibtex`` null for >99 % of
records — drives D2), author/editor structs, publisher/series structs and
www records whose homepage URL sits in ``note`` (drives D5).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import Row, SparkSession
from pyspark.sql import types as T

from ..core import algebra as A
from ..core import nip as N
from ..core.exprs import Like, a, cmp

D1_TITLE = "Answering Why-Not Questions on Nested Data"
D2_AUTHOR = "Ada Lovelace"
D3_EDITOR = "Erhard Weikum"
D4_AUTHOR = "Grace Hopper"
D5_AUTHOR = "Tim BL"

_STR = T.StringType()


def _struct(**fields):
    return T.StructType([T.StructField(k, v) for k, v in fields.items()])


PUBS_SCHEMA = T.StructType(
    [
        T.StructField("pkey", T.LongType()),
        T.StructField("title", _struct(text=_struct(value=_STR), bibtex=_struct(value=_STR))),
        T.StructField("booktitle", _STR),
        T.StructField("year", T.IntegerType()),
        T.StructField("venue", _struct(publisher=_struct(vname=_STR), series=_struct(vname=_STR))),
        T.StructField("author", _struct(pname=_STR)),
        T.StructField("editor", _struct(pname=_STR)),
        T.StructField("authors", T.ArrayType(_struct(aname=_STR))),
    ]
)

WWW_SCHEMA = T.StructType(
    [
        T.StructField("wauthor", _STR),
        T.StructField("sites", T.ArrayType(_struct(url=_STR))),
        T.StructField("note", _STR),
    ]
)


def _bulk_pubs(n: int, seed: int = 11) -> list[tuple]:
    g = np.random.default_rng(seed)
    venues = ["SIGMOD", "VLDB", "EDBT", "ICDE", "CIKM"]
    pubs = []
    for i in range(n):
        bt = venues[int(g.integers(0, len(venues)))]
        year = int(g.integers(2000, 2022))
        title_text = f"Paper {i} on {'SIGMOD internals' if g.random() < 0.05 else 'query processing'}"
        bibtex = (f"@inproceedings{{p{i}}}",) if g.random() < 0.01 else (None,)
        publisher = "ACM" if g.random() < 0.4 else "Springer"
        series = "LNCS" if publisher == "Springer" else "ICPS"
        author = f"Author {int(g.integers(0, max(2, n // 4)))}"
        editor = f"Editor {int(g.integers(0, 50))}"
        has_dey = g.random() < 0.02
        pubs.append(
            (
                i,
                ((title_text,), bibtex),
                bt,
                year,
                ((publisher,), (series,)),
                (author,),
                (editor,),
                [(f"{author}{' Dey' if has_dey else ''}",), (f"Coauthor {i % 97}",)],
            )
        )
    return pubs


def _planted_pubs() -> list[tuple]:
    return [
        # D1: the missing paper — booktitle IS "SIGMOD" but its title.text
        # does not contain the string "SIGMOD"
        (900001, ((D1_TITLE,), (None,)), "SIGMOD", 2021,
         (("ACM",), ("ICPS",)), ("Ralf D",), ("Ed One",),
         [("Ralf D",), ("Melanie H",)]),
        # D2: Ada's six articles — bibtex always null, text present
        *[
            (900010 + i, ((f"Ada Paper {i}",), (None,)), "VLDB", 2015 + i,
             (("ACM",), ("ICPS",)), (D2_AUTHOR,), ("Ed Two",), [(D2_AUTHOR,)])
            for i in range(6)
        ],
        # D3: Erhard is the EDITOR (not author) of the EDBT 2020 proceedings
        (900020, (("EDBT 2020 Proceedings",), (None,)), "EDBT", 2020,
         (("OpenProc",), ("OP",)), ("Some Author",), (D3_EDITOR,),
         [("Some Author",)]),
        # D4: Grace's papers (see module docstring of the scenario)
        #   P1: passes σ7 (year ≥ 2015) but publisher ≠ ACM, series ≠ ACM
        (900030, (("Grace P1",), (None,)), "ICDE", 2016,
         (("IEEE",), ("XSeries",)), (D4_AUTHOR,), ("Ed",), [(D4_AUTHOR,)]),
        #   P2: intended answer — year 2010, published in the ACM *series*
        (900031, (("Grace P2",), (None,)), "SIGMOD", 2010,
         (("Springer",), ("ACM",)), (D4_AUTHOR,), ("Ed",), [(D4_AUTHOR,)]),
        #   P3: blocked by both σ6 and σ7 under the SA (year 2012, no ACM)
        (900032, (("Grace P3",), (None,)), "CIKM", 2012,
         (("Elsevier",), ("ENCS",)), (D4_AUTHOR,), ("Ed",), [(D4_AUTHOR,)]),
    ]


def db(spark: SparkSession, sf: float = 0.01) -> dict:
    n = max(50, int(200_000 * sf))
    pubs = spark.createDataFrame(_bulk_pubs(n) + _planted_pubs(), PUBS_SCHEMA)
    g = np.random.default_rng(17)
    www = [
        (f"Author {i}", [(f"http://site{i}.org",)], None) for i in range(max(10, n // 20))
    ]
    # D5: Tim BL's www record — empty url list, homepage stored in `note`
    www.append((D5_AUTHOR, [], "http://tim.example.org"))
    return {"pubs": pubs, "www": spark.createDataFrame(www, WWW_SCHEMA)}


# -- D1: authors and titles of SIGMOD papers --------------------------------


def d1():
    fl = A.FlattenRel(A.TableAccess("pubs"), "authors")
    p1 = A.Project(
        fl,
        [
            ("author", "aname"),
            ("ptitle", "title.text.value"),
            ("venue_out", "title.text.value"),  # ERROR: should be booktitle
        ],
    )
    s2 = A.Select(p1, Like(a("venue_out"), "%SIGMOD%"))
    return s2, {"π1": p1.op_id, "σ2": s2.op_id, "F_a": fl.op_id}


def d1_whynot(db=None):
    return N.Tup({"author": N.WILD, "ptitle": N.Val(D1_TITLE), "venue_out": N.WILD})


def d1_alternatives():
    return {"title.text.value": ["booktitle"]}


# -- D2: article counts per author (not named Dey) --------------------------


def d2():
    fl = A.FlattenRel(A.TableAccess("pubs"), "authors")
    f3 = A.FlattenTup(fl, "title.bibtex")  # ERROR: should flatten title.text
    s4 = A.Select(f3, Like(a("aname"), "%Dey%", negated=True))
    g5 = A.GroupAgg(s4, ["aname"], [("count", "value", "cnt")])
    return g5, {"F^T3": f3.op_id, "σ4": s4.op_id, "γ5": g5.op_id, "F_a": fl.op_id}


def d2_whynot(db=None):
    return N.Tup({"aname": N.Val(D2_AUTHOR), "cnt": N.ValPred(cmp("cnt", ">=", 5))})


def d2_alternatives():
    return {"title.bibtex": ["title.text"]}


# -- D3: author-paper pairs per booktitle and year --------------------------


def d3():
    f = A.FlattenTup(A.TableAccess("pubs"), "author")  # ERROR: should be editor
    nt = A.NestTup(f, ["pname"], "ap")
    p = A.Project(nt, [("booktitle", "booktitle"), ("year", "year"), ("ap", "ap")])
    nr = A.NestRel(p, ["ap"], "pairs")
    return nr, {"F^T4": f.op_id, "N^T": nt.op_id, "π": p.op_id, "N^R": nr.op_id}


def d3_whynot(db=None):
    return N.Tup({
        "booktitle": N.Val("EDBT"), "year": N.Val(2020),
        "pairs": N.Bag([N.Tup({"ap": N.Tup({"pname": N.Val(D3_EDITOR)})})], star=True),
    })


def d3_alternatives():
    return {"author": ["editor"]}


# -- D4: papers per author published through ACM after 2010 ------------------


def d4():
    fl = A.FlattenRel(A.TableAccess("pubs"), "authors")
    f5 = A.FlattenTup(fl, "venue.publisher")  # SA: venue.series
    s6 = A.Select(f5, cmp("vname", "=", "ACM"))
    s7 = A.Select(s6, cmp("year", ">=", 2015))  # ERROR: intended 2010
    p = A.Project(s7, [("aname", "aname"), ("ptitle", "title.text.value")])
    nr = A.NestRel(p, ["ptitle"], "papers")
    return nr, {"F^T5": f5.op_id, "σ6": s6.op_id, "σ7": s7.op_id,
                "π": p.op_id, "N^R": nr.op_id, "F_a": fl.op_id}


def d4_whynot(db=None):
    return N.Tup({"aname": N.Val(D4_AUTHOR), "papers": N.Bag([N.WILD], star=True)})


def d4_alternatives():
    return {"venue.publisher": ["venue.series"]}


# -- D5: homepage urls per author --------------------------------------------


def d5():
    f9 = A.FlattenRel(A.TableAccess("www"), "sites")
    p8 = A.Project(f9, [("author", "wauthor"), ("hp", "url")])  # SA: url → note
    return p8, {"F^I9": f9.op_id, "π8": p8.op_id}


def d5_whynot(db=None):
    return N.Tup({"author": N.Val(D5_AUTHOR), "hp": N.WILD})


def d5_alternatives():
    return {"sites.url": ["note"]}
