"""Twitter scenarios T1–T4 and T_ASD (Tables 5/10) on synthetic tweets.

The paper's Twitter crawl has ~1000 mostly-nested attributes; the scenarios
touch ~15 of them, which we generate with the statistics that drive the
explanations: ``place.country`` is mostly null (tweets rarely carry a
geo-tagged place — T2/T4), ``entities.media`` is empty where
``extended_entities.media`` is filled (T1/T3), and retweets live in
``retweeted_status`` while the erroneous queries read ``quoted_status``
(T_ASD). ``mentions`` is a derived relation of mentioned user names (the
paper self-joins the tweet table; the derived relation is the join's right
input and keeps the scenario's operator structure — see DESIGN.md).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession
from pyspark.sql import types as T

from ..core import algebra as A
from ..core import nip as N
from ..core.exprs import And, Like, a, cmp

T1_TWEET = 4242
T2_USER = "army_fan"
T3_USER = "cool_user"
T4_TAG = "#ChelseaFC"
TASD_TWEET = 777

_STR = T.StringType()


def _struct(**fields):
    return T.StructType([T.StructField(k, v) for k, v in fields.items()])


STATUS = _struct(rid=T.LongType(), rtext=_STR, rcount=T.LongType())

TWEETS_SCHEMA = T.StructType(
    [
        T.StructField("tid", T.LongType()),
        T.StructField("text", _STR),
        T.StructField("user", _struct(name=_STR, location=_STR)),
        T.StructField("place", _struct(country=_STR)),
        T.StructField("profile", _struct(country=_STR)),
        T.StructField(
            "entities",
            _struct(
                hashtags=T.ArrayType(_struct(tag=_STR)),
                media=T.ArrayType(_struct(murl=_STR)),
                urls=T.ArrayType(_struct(murl=_STR)),
            ),
        ),
        T.StructField("extended_entities", _struct(media=T.ArrayType(_struct(murl=_STR)))),
        T.StructField("retweeted_status", STATUS),
        T.StructField("quoted_status", STATUS),
    ]
)


def _bulk_tweets(n: int, seed: int = 23) -> list[tuple]:
    g = np.random.default_rng(seed)
    rows = []
    for i in range(n):
        country = "US" if g.random() < 0.03 else None  # place mostly null
        has_media = g.random() < 0.3
        media = [(f"http://m/{i}",)] if has_media else []
        tags = [(f"#tag{int(g.integers(0, 40))}",)] if g.random() < 0.5 else []
        text = f"tweet {i} " + ("UEFA final!" if g.random() < 0.05 else "daily life")
        rt = (int(g.integers(1, 1000)), f"rt text {i}", int(g.integers(1, 9000))) if g.random() < 0.2 else None
        qt = (int(g.integers(1, 1000)), f"qt text {i}", int(g.integers(1, 900))) if g.random() < 0.1 else None
        rows.append(
            (
                i + 10000,
                text,
                (f"user{int(g.integers(0, max(2, n // 5)))}", "somewhere"),
                (country,),
                ("US" if g.random() < 0.5 else None,),
                (tags, media, [(f"http://u/{i}",)] if g.random() < 0.2 else []),
                (media,),
                rt,
                qt,
            )
        )
    return rows


def _planted_tweets() -> list[tuple]:
    return [
        # T1/T3: media urls only in extended_entities; text about LeBron
        (T1_TWEET, "LeBron James dunks again", (T3_USER, "LA"), (None,), (None,),
         ([("#nba",)], [], [("http://u/lebron",)]),
         ([("http://m/lebron",)],), None, None),
        # T2: the US fan — BTS tweet, place.country null, profile country US
        (91001, "BTS concert was amazing", (T2_USER, "Seoul?"), (None,), ("US",),
         ([("#bts",)], [], []), ([],), None, None),
        #      second tweet without BTS text (needed for {σ14, σ15})
        (91002, "waiting in line", (T2_USER, "Seoul?"), (None,), (None,),
         ([("#kpop",)], [], []), ([],), None, None),
        # T4 (a): UEFA tweets with the club hashtag, geo only in profile
        (92001, "UEFA semifinal tonight", ("fan1", "UK"), (None,), ("England",),
         ([(T4_TAG,)], [], []), ([],), None, None),
        (92002, "UEFA what a match", ("fan2", "UK"), (None,), ("England",),
         ([(T4_TAG,)], [], []), ([],), None, None),
        # T4 (b): club tweet without UEFA text, no geo anywhere
        (92003, "training day", ("fan3", "UK"), (None,), (None,),
         ([(T4_TAG,)], [], []), ([],), None, None),
        # T_ASD: three captures retweeting the famous tweet 777
        (93001, "rt 1", ("u1", "x"), (None,), (None,), ([], [], []), ([],),
         (TASD_TWEET, "GOAT moment", 5000), None),
        (93002, "rt 2", ("u2", "x"), (None,), (None,), ([], [], []), ([],),
         (TASD_TWEET, "GOAT moment", 4000), None),
        #      a capture whose promoted retweet_count is 0 (drives {F²¹, σ²²})
        (93003, "rt 3", ("u3", "x"), (None,), (None,), ([], [], []), ([],),
         (TASD_TWEET, "GOAT moment", 0), None),
    ]


def db(spark: SparkSession, sf: float = 0.01) -> dict:
    n = max(100, int(100_000 * sf))
    tweets = spark.createDataFrame(_bulk_tweets(n) + _planted_tweets(), TWEETS_SCHEMA)
    mentions = spark.createDataFrame(
        [(T3_USER,), ("user1",), ("user2",)], "mname string"
    )
    return {"tweets": tweets, "mentions": mentions}


# -- T1: tweets with media urls about a basketball player --------------------


def t1():
    f10 = A.FlattenTup(A.TableAccess("tweets"), "entities")  # SA: extended_entities
    f11 = A.FlattenRel(f10, "media")
    s12 = A.Select(f11, Like(a("text"), "%Michael Jordan%"))  # ERROR: ≠ LeBron James
    p = A.Project(s12, [("tid", "tid"), ("murl", "murl")])
    return p, {"F^T10": f10.op_id, "F^I11": f11.op_id, "σ12": s12.op_id, "π": p.op_id}


def t1_whynot(db=None):
    return N.Tup({"tid": N.Val(T1_TWEET), "murl": N.WILD})


def t1_alternatives():
    return {"entities": ["extended_entities"]}


# -- T2: users who tweeted about BTS in the US -------------------------------


def t2():
    f13 = A.FlattenTup(A.TableAccess("tweets"), "place")  # SA: profile
    s14 = A.Select(f13, Like(a("text"), "%BTS%"))
    s15 = A.Select(s14, cmp("country", "=", "US"))
    p = A.Project(s15, [("uname", "user.name"), ("tid", "tid")])
    return p, {"F^T13": f13.op_id, "σ14": s14.op_id, "σ15": s15.op_id, "π": p.op_id}


def t2_whynot(db=None):
    return N.Tup({"uname": N.Val(T2_USER), "tid": N.WILD})


def t2_alternatives():
    return {"place": ["profile"]}


# -- T3: hashtags/media for users mentioned in other tweets ------------------


def t3():
    f16 = A.FlattenTup(A.TableAccess("tweets"), "entities")  # SA: extended_entities
    f17 = A.FlattenRel(f16, "media")
    s = A.Select(f17, cmp("tid", ">", 0))
    p = A.Project(s, [("uname", "user.name"), ("murl", "murl")])
    j = A.Join(p, A.TableAccess("mentions"), [("uname", "mname")])
    return j, {"F^T16": f16.op_id, "F^I17": f17.op_id, "σ": s.op_id,
               "π": p.op_id, "⋈18": j.op_id}


def t3_whynot(db=None):
    return N.Tup({"uname": N.Val(T3_USER), "murl": N.WILD, "mname": N.WILD})


def t3_alternatives():
    return {"entities": ["extended_entities"]}


# -- T4: countries per hashtag for UEFA tweets -------------------------------


def t4():
    f18 = A.FlattenTup(A.TableAccess("tweets"), "place")  # SA: profile
    fh = A.FlattenRel(f18, "entities.hashtags")
    s19 = A.Select(fh, Like(a("text"), "%UEFA%"))
    g = A.GroupAgg(s19, ["tag"], [("count", "country", "ccount")])
    s20 = A.Select(g, cmp("ccount", ">", 0))
    return s20, {"F^T18": f18.op_id, "F_h": fh.op_id, "σ19": s19.op_id,
                 "γ": g.op_id, "σ20": s20.op_id}


def t4_whynot(db=None):
    return N.Tup({"tag": N.Val(T4_TAG), "ccount": N.WILD})


def t4_alternatives():
    return {"place": ["profile"]}


# -- T_ASD: extract the flat relation of retweeted tweets --------------------


def tasd():
    f21 = A.FlattenTup(A.TableAccess("tweets"), "quoted_status")  # ERROR: retweeted_status
    s22 = A.Select(f21, cmp("rcount", ">", 0))  # ERROR: quote count ≠ retweet count
    p = A.Project(s22, [("rid", "rid"), ("rtext", "rtext"), ("rcount", "rcount")])
    return p, {"F21": f21.op_id, "σ22": s22.op_id, "π": p.op_id}


def tasd_whynot(db=None):
    return N.Tup({"rid": N.Val(TASD_TWEET), "rtext": N.WILD, "rcount": N.WILD})


def tasd_alternatives():
    return {"quoted_status": ["retweeted_status"]}
