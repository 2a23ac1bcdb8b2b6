"""Adapted LDBC SNB Interactive Short (IS) and Complex (IC) queries.

These mirror the paper's Appendix B modifications (fixed-length
patterns, no ORDER BY, no shortest paths, no variable-length joins),
re-targeted at the ``ldbc_lite`` schema. Like the paper, IC10 is
omitted. Join orders start at the selective filtered vertex and extend
left-deep, the plan style the paper picks manually for GraphflowDB.
"""
from __future__ import annotations

from repro.proc.plan import Predicate as Pr
from repro.proc.plan import QueryEdge as E
from repro.proc.plan import QuerySpec

PERSON_ID = 3
COMMENT_ID = 5
DATE_MID = 1_375_000_000
DATE_Q_LO = 1_250_000_000
DATE_Q_HI = 1_500_000_000

IS_QUERIES: list[QuerySpec] = [
    QuerySpec(
        "IS01",
        {"p": "Person", "pl": "Place"},
        [E("p", "pl", "personIsLocatedIn")],
        [Pr("p", "id", "=", PERSON_ID)],
        [("p", "fName"), ("p", "lName"), ("p", "birthday"),
         ("p", "locationIP"), ("p", "browserUsed"), ("p", "gender"),
         ("p", "creationDate"), ("pl", "id")],
        ["p", "pl"],
    ),
    QuerySpec(
        "IS02",
        {"p": "Person", "c": "Comment", "post": "Post", "op": "Person"},
        [E("c", "p", "hasCreator"), E("c", "post", "replyOfPost"),
         E("post", "op", "postHasCreator")],
        [Pr("p", "id", "=", PERSON_ID)],
        [("c", "id"), ("c", "content"), ("c", "creationDate"),
         ("op", "id"), ("op", "fName"), ("op", "lName")],
        ["p", "c", "post", "op"],
    ),
    QuerySpec(
        "IS03",
        {"p": "Person", "friend": "Person"},
        [E("p", "friend", "knows", "k")],
        [Pr("p", "id", "=", PERSON_ID)],
        [("friend", "id"), ("friend", "fName"), ("friend", "lName"),
         ("k", "date")],
        ["p", "friend"],
    ),
    QuerySpec(
        "IS04",
        {"comment": "Comment"},
        [],
        [Pr("comment", "id", "=", COMMENT_ID)],
        [("comment", "creationDate"), ("comment", "content")],
    ),
    QuerySpec(
        "IS05",
        {"comment": "Comment", "p": "Person"},
        [E("comment", "p", "hasCreator")],
        [Pr("comment", "id", "=", COMMENT_ID)],
        [("p", "id"), ("p", "fName"), ("p", "lName")],
        ["comment", "p"],
    ),
    QuerySpec(
        "IS06",
        {"comment": "Comment", "pst": "Post", "f": "Forum", "p": "Person"},
        [E("comment", "pst", "replyOfPost"), E("f", "pst", "containerOf"),
         E("f", "p", "hasModerator")],
        [Pr("comment", "id", "=", COMMENT_ID)],
        [("f", "id"), ("f", "title"), ("p", "id"), ("p", "fName"),
         ("p", "lName")],
        ["comment", "pst", "f", "p"],
    ),
    QuerySpec(
        "IS07",
        {"mAuth": "Person", "cmt0": "Comment", "cmt1": "Comment",
         "rAuth": "Person"},
        [E("cmt0", "mAuth", "hasCreator"), E("cmt1", "cmt0", "replyOf"),
         E("cmt1", "rAuth", "hasCreator")],
        [Pr("cmt0", "id", "=", COMMENT_ID)],
        [("cmt1", "id"), ("cmt1", "content"), ("cmt1", "creationDate"),
         ("rAuth", "id"), ("rAuth", "fName"), ("rAuth", "lName")],
        ["cmt0", "mAuth", "cmt1", "rAuth"],
    ),
]

IC_QUERIES: list[QuerySpec] = [
    QuerySpec(
        "IC01",
        {"p": "Person", "p1": "Person", "p2": "Person", "op": "Person",
         "pl": "Place"},
        [E("p", "p1", "knows"), E("p1", "p2", "knows"),
         E("p2", "op", "knows"), E("op", "pl", "personIsLocatedIn")],
        [Pr("p", "id", "=", PERSON_ID)],
        [("op", "id"), ("op", "lName"), ("op", "birthday"),
         ("op", "creationDate"), ("op", "gender"), ("op", "locationIP"),
         ("pl", "name")],
        ["p", "p1", "p2", "op", "pl"],
    ),
    QuerySpec(
        "IC02",
        {"p": "Person", "frnd": "Person", "msg": "Comment"},
        [E("p", "frnd", "knows"), E("msg", "frnd", "hasCreator")],
        [Pr("p", "id", "=", PERSON_ID),
         Pr("msg", "creationDate", "<", DATE_MID)],
        [("frnd", "id"), ("frnd", "fName"), ("frnd", "lName"),
         ("msg", "id"), ("msg", "content"), ("msg", "creationDate")],
        ["p", "frnd", "msg"],
    ),
    QuerySpec(
        "IC03",
        {"person": "Person", "p1": "Person", "op": "Person", "pl": "Place",
         "mx": "Comment", "px": "Place", "my": "Comment", "py": "Place"},
        [E("person", "p1", "knows"), E("p1", "op", "knows"),
         E("op", "pl", "personIsLocatedIn"),
         E("mx", "op", "hasCreator"), E("mx", "px", "commentIsLocatedIn"),
         E("my", "op", "hasCreator"), E("my", "py", "commentIsLocatedIn")],
        [Pr("person", "id", "=", PERSON_ID),
         Pr("mx", "creationDate", ">=", DATE_Q_LO),
         Pr("mx", "creationDate", "<=", DATE_Q_HI),
         Pr("my", "creationDate", ">=", DATE_Q_LO),
         Pr("my", "creationDate", "<=", DATE_Q_HI),
         Pr("px", "name", "=", "India"), Pr("py", "name", "=", "China")],
        [("op", "id"), ("mx", "id"), ("my", "id")],
        ["person", "p1", "op", "pl", "mx", "px", "my", "py"],
    ),
    QuerySpec(
        "IC04",
        {"p": "Person", "frnd": "Person", "pst": "Post", "t": "Tag"},
        [E("p", "frnd", "knows"), E("pst", "frnd", "postHasCreator"),
         E("pst", "t", "hasTag")],
        [Pr("p", "id", "=", PERSON_ID),
         Pr("pst", "creationDate", ">=", DATE_Q_LO),
         Pr("pst", "creationDate", "<=", DATE_Q_HI)],
        [("t", "name")],
        ["p", "frnd", "pst", "t"],
    ),
    QuerySpec(
        "IC05",
        {"p1": "Person", "p2": "Person", "p3": "Person", "f": "Forum",
         "pst": "Post"},
        [E("p1", "p2", "knows"), E("p2", "p3", "knows"),
         E("f", "p3", "hasMember", "hm"), E("f", "pst", "containerOf")],
        [Pr("p1", "id", "=", PERSON_ID), Pr("hm", "date", ">", DATE_MID)],
        [("f", "title")],
        ["p1", "p2", "p3", "f", "pst"],
    ),
    QuerySpec(
        "IC06",
        {"p1": "Person", "p2": "Person", "p3": "Person", "pst": "Post",
         "t1": "Tag", "t2": "Tag"},
        [E("p1", "p2", "knows"), E("p2", "p3", "knows"),
         E("pst", "p3", "postHasCreator"), E("pst", "t1", "hasTag"),
         E("pst", "t2", "hasTag")],
        [Pr("p1", "id", "=", PERSON_ID), Pr("t1", "name", "=", "Rumi"),
         Pr("t2", "name", "<>", "Rumi")],
        [("t2", "name")],
        ["p1", "p2", "p3", "pst", "t1", "t2"],
    ),
    QuerySpec(
        "IC07",
        {"p": "Person", "cmt": "Comment", "frnd": "Person"},
        [E("cmt", "p", "hasCreator"), E("frnd", "cmt", "likes", "l")],
        [Pr("p", "id", "=", PERSON_ID)],
        [("frnd", "id"), ("frnd", "fName"), ("frnd", "lName"),
         ("l", "date"), ("cmt", "content")],
        ["p", "cmt", "frnd"],
    ),
    QuerySpec(
        "IC08",
        {"p": "Person", "pst": "Post", "cmt": "Comment",
         "cmtAuth": "Person"},
        [E("pst", "p", "postHasCreator"), E("cmt", "pst", "replyOfPost"),
         E("cmt", "cmtAuth", "hasCreator")],
        [Pr("p", "id", "=", PERSON_ID)],
        [("cmtAuth", "id"), ("cmtAuth", "fName"), ("cmtAuth", "lName"),
         ("cmt", "creationDate"), ("cmt", "id"), ("cmt", "content")],
        ["p", "pst", "cmt", "cmtAuth"],
    ),
    QuerySpec(
        "IC09",
        {"p1": "Person", "p2": "Person", "p3": "Person", "cmt": "Comment"},
        [E("p1", "p2", "knows"), E("p2", "p3", "knows"),
         E("cmt", "p3", "hasCreator")],
        [Pr("p1", "id", "=", PERSON_ID),
         Pr("cmt", "creationDate", "<", DATE_MID)],
        [("p3", "id"), ("p3", "fName"), ("p3", "lName"), ("cmt", "id"),
         ("cmt", "content"), ("cmt", "creationDate")],
        ["p1", "p2", "p3", "cmt"],
    ),
    QuerySpec(
        "IC11",
        {"p1": "Person", "p2": "Person", "p3": "Person",
         "org": "Org", "pl": "Place"},
        [E("p1", "p2", "knows"), E("p2", "p3", "knows"),
         E("p3", "org", "workAt", "w"), E("org", "pl", "orgIsLocatedIn")],
        [Pr("p1", "id", "=", PERSON_ID), Pr("w", "year", "<", 2016),
         Pr("pl", "name", "=", "China")],
        [("p3", "id"), ("p3", "fName"), ("p3", "lName"), ("org", "name")],
        ["p1", "p2", "p3", "org", "pl"],
    ),
    QuerySpec(
        "IC12",
        {"p1": "Person", "p2": "Person", "cmt": "Comment", "pst": "Post",
         "t": "Tag", "tc": "TagClass", "tc2": "TagClass"},
        [E("p1", "p2", "knows"), E("cmt", "p2", "hasCreator"),
         E("cmt", "pst", "replyOfPost"), E("pst", "t", "hasTag"),
         E("t", "tc", "hasType"), E("tc", "tc2", "isSubclassOf")],
        [Pr("p1", "id", "=", PERSON_ID), Pr("tc", "name", "=", "Person")],
        [("p2", "id"), ("p2", "fName"), ("p2", "lName")],
        ["p1", "p2", "cmt", "pst", "t", "tc", "tc2"],
    ),
]

ALL_LDBC = IS_QUERIES + IC_QUERIES
