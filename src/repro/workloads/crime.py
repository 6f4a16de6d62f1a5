"""Crime scenarios C1–C3 (Table 6) — the Why-Not [9] / Conseil [19] comparison.

The paper reuses Why-Not's crime example: persons ``P``, witnesses ``W``,
sightings ``S`` and crimes ``C``. The dataset is tiny and fully determined
by the three stories of §6.4; we hand-craft tuples that realize them:

- **C1**: Roger exists in P but without blue hair; even a Roger passing
  σ¹ lacks a witness join partner → ours/Conseil return {σ¹, ⋈²},
  Why-Not stops at {σ¹}.
- **C2**: witnesses satisfy σ³ (sector > 90) but none is named Susan; the
  baselines return {σ⁴}, ours additionally {σ³, σ⁴}.
- **C3**: the only sighting witnessed by Ashishbakshi has the "snow"
  description in ``clothes`` not ``hair``; the join cannot be fixed without
  a cross product, so ours returns {π⁶} (via the hair→clothes SA) and NOT
  the join, while Why-Not/Conseil blame {⋈⁵}.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..core import algebra as A
from ..core import nip as N
from ..core.exprs import cmp


def db(spark: SparkSession) -> dict:
    P = spark.createDataFrame(
        [
            ("Roger", "red", "coat"),
            ("Alice", "blue", "dress"),
            ("Conedera", "green", "vest"),
        ],
        "pname string, hair string, clothes string",
    )
    W = spark.createDataFrame(
        [
            ("Momo", 12),
            ("Lena", 95),
            ("Karl", 97),
            ("Ruth", 50),
            ("Ashishbakshi", 7),
        ],
        "wname string, wsector int",
    )
    # sightings: who was seen (hair/clothes), by which witness, in which sector
    S = spark.createDataFrame(
        [
            # C1: a sighting matching Roger's look, but witness "Nemo" ∉ W
            ("red", "coat", "Nemo", 12),
            # C2: Lena (sector 95) and Ruth (sector 50) both saw Conedera
            ("green", "vest", "Lena", 95),
            ("green", "vest", "Ruth", 50),
            # C3: Ashishbakshi's sighting — description in clothes, not hair
            ("brown", "snow", "Ashishbakshi", 7),
            # C3: a "snow"-haired sighting whose witness "Ghost" ∉ W
            ("snow", "x", "Ghost", 7),
            # background noise
            ("blue", "dress", "Karl", 97),
        ],
        "shair string, sclothes string, switness string, ssector int",
    )
    C = spark.createDataFrame(
        [(12, "theft"), (95, "arson"), (97, "fraud"), (7, "burglary"), (50, "theft")],
        "csector int, ctype string",
    )
    return {"P": P, "W": W, "S": S, "C": C}


# ---------------------------------------------------------------------------
# C1: π_{name,type}( C ⋈_sector ( W ⋈²_{name=witness} ( S ⋈_{hair,clothes} σ¹_{hair="blue"}(P) ) ) )
# ---------------------------------------------------------------------------


def c1_query():
    sel = A.Select(A.TableAccess("P"), cmp("hair", "=", "blue"))  # σ¹
    j_s = A.Join(sel, A.TableAccess("S"), [("hair", "shair"), ("clothes", "sclothes")])
    j_w = A.Join(j_s, A.TableAccess("W"), [("switness", "wname")])  # ⋈²
    j_c = A.Join(j_w, A.TableAccess("C"), [("ssector", "csector")])
    proj = A.Project(j_c, [("name", "pname"), ("type", "ctype")])
    tags = {"σ1": sel.op_id, "⋈2": j_w.op_id, "⋈S": j_s.op_id, "⋈C": j_c.op_id, "π": proj.op_id}
    return proj, tags


def c1_whynot(db=None):
    return N.Tup({"name": N.Val("Roger"), "type": N.WILD})


# ---------------------------------------------------------------------------
# C2: π_{P.name}( P ⋈_{hair,clothes} ( S ⋈_{W.name=witness} ( C ⋈_sector σ⁴_{name="Susan"}( σ³_{sector>90}(W) ) ) ) )
# ---------------------------------------------------------------------------


def c2_query():
    s3 = A.Select(A.TableAccess("W"), cmp("wsector", ">", 90))  # σ³
    s4 = A.Select(s3, cmp("wname", "=", "Susan"))  # σ⁴
    j_c = A.Join(s4, A.TableAccess("C"), [("wsector", "csector")])
    j_s = A.Join(j_c, A.TableAccess("S"), [("wname", "switness")])
    j_p = A.Join(j_s, A.TableAccess("P"), [("shair", "hair"), ("sclothes", "clothes")])
    proj = A.Project(j_p, [("name", "pname")])
    tags = {"σ3": s3.op_id, "σ4": s4.op_id, "⋈C": j_c.op_id, "⋈S": j_s.op_id, "⋈P": j_p.op_id}
    return proj, tags


def c2_whynot(db=None):
    return N.tup(name="Conedera")


# ---------------------------------------------------------------------------
# C3: π⁶_{name, desc←hair}( S ⋈⁵_{name=witness} ( W ⋈_sector C ) )
# ---------------------------------------------------------------------------


def c3_query():
    j_wc = A.Join(A.TableAccess("W"), A.TableAccess("C"), [("wsector", "csector")])
    j_s = A.Join(j_wc, A.TableAccess("S"), [("wname", "switness")])  # ⋈⁵
    proj = A.Project(j_s, [("name", "wname"), ("desc", "shair")])  # π⁶
    tags = {"⋈5": j_s.op_id, "⋈WC": j_wc.op_id, "π6": proj.op_id}
    return proj, tags


def c3_whynot(db=None):
    return N.tup(name="Ashishbakshi", desc="snow")


def c3_alternatives():
    return {"shair": ["sclothes"]}
