"""The 25 SNB-M queries (paper Appendix A) as QuerySpecs.

SNB-M is the paper's modified LDBC SNB interactive workload: shortest-path
queries removed, variable-length joins decomposed into fixed-length variants
(suffix ``-ℓ``). The query texts below follow Appendix A with its obvious
typos fixed (consistent aliases, ``p1.id`` vs ``person.id`` etc.); constants
(person 933, comment ids, 'Rahul', 'Rumi', 'India', 'China', 'Person', date
thresholds) are kept verbatim and exist in the SNB-lite generator.
"""
from __future__ import annotations

from repro.plan.spec import JoinEdge, QuerySpec, TableRef

T, J = TableRef, JoinEdge.of


def _q(name, tables, joins, filters, select, **kw) -> QuerySpec:
    return QuerySpec(name=name, tables=tables, joins=joins, filters=filters,
                     select=select, **kw)


def specs() -> dict[str, QuerySpec]:
    qs: list[QuerySpec] = []

    qs.append(_q(
        "IS1",
        [T("p", "person"), T("pl", "place")],
        [J("p.placeid", "pl.placeid")],
        ["p.id = 933"],
        [("p.firstname", "firstname"), ("p.lastname", "lastname"),
         ("p.birthday", "birthday"), ("p.locationip", "locationip"),
         ("p.browserused", "browserused"), ("pl.placeid", "placeid"),
         ("p.gender", "gender"), ("p.creationdate", "creationdate")],
    ))
    qs.append(_q(
        "IS2",
        [T("p1", "person"), T("m1", "comment"), T("m2", "post"), T("p2", "person")],
        [J("m2.creatorid", "p2.personid"), J("m1.replyof_post", "m2.id"),
         J("m1.creatorid", "p1.personid")],
        ["p1.id = 933"],
        [("m1.id", "m1id"), ("m1.creationdate", "m1date"), ("m2.id", "m2id"),
         ("p2.personid", "p2id"), ("p2.firstname", "firstname"),
         ("p2.lastname", "lastname")],
    ))
    qs.append(_q(
        "IS3",
        [T("k", "knows"), T("p1", "person"), T("p2", "person")],
        [J("p1.personid", "k.person1id"), J("k.person2id", "p2.personid")],
        ["p1.id = 933"],
        [("p2.personid", "p2id"), ("p2.firstname", "firstname"),
         ("p2.lastname", "lastname"), ("k.creationdate", "kdate")],
    ))
    qs.append(_q(
        "IS4",
        [T("c", "comment")], [],
        ["c.id = 4947802324993"],
        [("c.content", "content"), ("c.creationdate", "creationdate")],
    ))
    qs.append(_q(
        "IS5",
        [T("c", "comment"), T("p", "person")],
        [J("c.creatorid", "p.personid")],
        ["c.id = 4947802324993"],
        [("p.personid", "pid"), ("p.firstname", "firstname"),
         ("p.lastname", "lastname")],
    ))
    qs.append(_q(
        "IS6",
        [T("m1", "comment"), T("m2", "post"), T("p", "person"), T("f", "forum")],
        [J("m1.replyof_post", "m2.id"), J("m2.forumid", "f.forumid"),
         J("f.moderatorid", "p.personid")],
        ["m1.id = 4947802324993"],
        [("f.forumid", "forumid"), ("f.title", "title"), ("p.personid", "pid"),
         ("p.firstname", "firstname"), ("p.lastname", "lastname")],
    ))
    qs.append(_q(
        "IS7",
        [T("m1", "comment"), T("m2", "comment"), T("p", "person")],
        [J("m2.replyof_comment", "m1.id"), J("m2.creatorid", "p.personid")],
        ["m1.id = 8246337208329"],
        [("m2.id", "m2id"), ("m2.content", "content"),
         ("m2.creationdate", "creationdate"), ("p.personid", "pid"),
         ("p.firstname", "firstname"), ("p.lastname", "lastname")],
    ))

    _ic1_sel = [
        ("p2.id", "p2id"), ("p2.lastname", "lastname"), ("p2.birthday", "birthday"),
        ("p2.creationdate", "creationdate"), ("p2.gender", "gender"),
        ("p2.browserused", "browserused"), ("p2.locationip", "locationip"),
        ("pl.name", "placename"),
    ]
    qs.append(_q(
        "IC1-1",
        [T("p1", "person"), T("k", "knows"), T("p2", "person"), T("pl", "place")],
        [J("p1.personid", "k.person1id"), J("k.person2id", "p2.personid"),
         J("p2.placeid", "pl.placeid")],
        ["p1.id = 933", "p2.firstname = 'Rahul'"],
        _ic1_sel,
    ))
    qs.append(_q(
        "IC1-2",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("p2", "person"),
         T("pl", "place")],
        [J("p1.personid", "k1.person1id"), J("k1.person2id", "k2.person1id"),
         J("k2.person2id", "p2.personid"), J("p2.placeid", "pl.placeid")],
        ["p1.id = 933", "p2.firstname = 'Rahul'"],
        _ic1_sel,
    ))
    qs.append(_q(
        "IC1-3",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("k3", "knows"),
         T("p2", "person"), T("pl", "place")],
        [J("p1.personid", "k1.person1id"), J("k1.person2id", "k2.person1id"),
         J("k2.person2id", "k3.person1id"), J("k3.person2id", "p2.personid"),
         J("p2.placeid", "pl.placeid")],
        ["p1.id = 933", "p2.firstname = 'Rahul'"],
        _ic1_sel,
    ))
    qs.append(_q(
        "IC2",
        [T("p1", "person"), T("k", "knows"), T("p2", "person"), T("c", "comment")],
        [J("p2.personid", "c.creatorid"), J("k.person2id", "p2.personid"),
         J("p1.personid", "k.person1id")],
        ["p1.id = 933", "c.creationdate < 1338552000"],
        [("p2.id", "p2id"), ("p2.firstname", "firstname"),
         ("p2.lastname", "lastname"), ("c.id", "cid"), ("c.content", "content"),
         ("c.creationdate", "cdate")],
    ))
    _ic3_sel = [("p2.id", "p2id"), ("p2.firstname", "firstname"),
                ("p2.lastname", "lastname")]
    qs.append(_q(
        "IC3-1",
        [T("p1", "person"), T("k1", "knows"), T("p2", "person"), T("m1", "comment"),
         T("pl1", "place"), T("m2", "comment"), T("pl2", "place")],
        [J("p1.personid", "k1.person1id"), J("k1.person2id", "p2.personid"),
         J("m2.creatorid", "p2.personid"), J("m1.locationid", "pl1.placeid"),
         J("m1.creatorid", "p2.personid"), J("m2.locationid", "pl2.placeid")],
        ["m1.creationdate >= 1313591219", "m1.creationdate < 1513591219",
         "m2.creationdate >= 1313591219", "m2.creationdate < 1513591219",
         "p1.id = 933", "pl1.name = 'India'", "pl2.name = 'China'"],
        _ic3_sel,
    ))
    qs.append(_q(
        "IC3-2",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("p2", "person"),
         T("m1", "comment"), T("pl1", "place"), T("m2", "comment"), T("pl2", "place")],
        [J("p1.personid", "k1.person1id"), J("k2.person1id", "k1.person2id"),
         J("k2.person2id", "p2.personid"), J("m2.creatorid", "p2.personid"),
         J("m1.locationid", "pl1.placeid"), J("m1.creatorid", "p2.personid"),
         J("m2.locationid", "pl2.placeid")],
        ["m2.creationdate >= 1313591219", "m2.creationdate < 1513591219",
         "m1.creationdate >= 1313591219", "m1.creationdate < 1513591219",
         "p1.id = 933", "pl1.name = 'India'", "pl2.name = 'China'"],
        _ic3_sel,
    ))
    qs.append(_q(
        "IC4",
        [T("k1", "knows"), T("p1", "person"), T("k2", "knows"), T("p2", "person"),
         T("ps", "post"), T("mt", "post_tag"), T("t", "tag")],
        [J("mt.tagid", "t.tagid"), J("ps.id", "mt.messageid"),
         J("p2.personid", "ps.creatorid"), J("k2.person2id", "p2.personid"),
         J("p1.personid", "k2.person1id"), J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "ps.creationdate >= 1313591219",
         "ps.creationdate < 1513591219"],
        [("t.name", "tagname")],
    ))
    qs.append(_q(
        "IC5-1",
        [T("p1", "person"), T("k1", "knows"), T("p2", "person"),
         T("fp", "forum_person"), T("f", "forum"), T("m", "post")],
        [J("f.forumid", "m.forumid"), J("fp.forumid", "f.forumid"),
         J("p2.personid", "fp.personid"), J("k1.person2id", "p2.personid"),
         J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "fp.joindate >= 1353819600"],
        [("f.title", "title")],
    ))
    qs.append(_q(
        "IC5-2",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("p2", "person"),
         T("fp", "forum_person"), T("f", "forum"), T("m", "post")],
        [J("f.forumid", "m.forumid"), J("fp.forumid", "f.forumid"),
         J("p2.personid", "fp.personid"), J("k2.person2id", "p2.personid"),
         J("k1.person2id", "k2.person1id"), J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "fp.joindate >= 1353819600"],
        [("f.title", "title")],
    ))
    _ic6_tables = [T("p1", "person"), T("k1", "knows"), T("p2", "person"),
                   T("m", "post"), T("mt1", "post_tag"), T("t1", "tag"),
                   T("mt2", "post_tag"), T("t2", "tag")]
    _ic6_joins = [J("mt1.tagid", "t1.tagid"), J("m.id", "mt1.messageid"),
                  J("mt2.tagid", "t2.tagid"), J("m.id", "mt2.messageid"),
                  J("m.creatorid", "p2.personid"), J("k1.person2id", "p2.personid"),
                  J("p1.personid", "k1.person1id")]
    qs.append(_q(
        "IC6-1", _ic6_tables, _ic6_joins,
        ["p1.id = 933", "t1.name = 'Rumi'", "t2.name != 'Rumi'"],
        [("t2.name", "tagname")],
    ))
    qs.append(_q(
        "IC6-2",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("p2", "person"),
         T("m", "post"), T("mt1", "post_tag"), T("t1", "tag"),
         T("mt2", "post_tag"), T("t2", "tag")],
        [J("mt1.tagid", "t1.tagid"), J("m.id", "mt1.messageid"),
         J("mt2.tagid", "t2.tagid"), J("m.id", "mt2.messageid"),
         J("m.creatorid", "p2.personid"), J("k2.person2id", "p2.personid"),
         J("k1.person2id", "k2.person1id"), J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "t1.name = 'Rumi'", "t2.name != 'Rumi'"],
        [("t2.name", "tagname")],
    ))
    qs.append(_q(
        "IC7",
        [T("p1", "person"), T("c", "comment"), T("l", "likes_comment"),
         T("p2", "person")],
        [J("p2.personid", "l.personid"), J("c.id", "l.messageid"),
         J("c.creatorid", "p1.personid")],
        ["p1.id = 933"],
        [("p2.personid", "p2id"), ("p2.firstname", "firstname"),
         ("p2.lastname", "lastname"), ("l.creationdate", "likedate"),
         ("c.content", "content")],
    ))
    qs.append(_q(
        "IC8",
        [T("p1", "person"), T("ps", "post"), T("c", "comment"), T("p2", "person")],
        [J("c.creatorid", "p2.personid"), J("c.replyof_post", "ps.id"),
         J("p1.personid", "ps.creatorid")],
        ["p1.id = 933"],
        [("c.creatorid", "creatorid"), ("p2.firstname", "firstname"),
         ("p2.lastname", "lastname"), ("c.creationdate", "cdate"),
         ("c.id", "cid"), ("c.content", "content")],
    ))
    qs.append(_q(
        "IC9-1",
        [T("p1", "person"), T("k1", "knows"), T("p2", "person"), T("c", "comment")],
        [J("p2.personid", "c.creatorid"), J("k1.person2id", "p2.personid"),
         J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "c.creationdate < 1342840042"],
        [("p2.firstname", "firstname"), ("p2.lastname", "lastname"),
         ("c.creationdate", "cdate")],
    ))
    qs.append(_q(
        "IC9-2",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("p2", "person"),
         T("c", "comment")],
        [J("p2.personid", "c.creatorid"), J("k2.person2id", "p2.personid"),
         J("k1.person2id", "k2.person1id"), J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "c.creationdate < 1342840042"],
        [("p2.firstname", "firstname"), ("p2.lastname", "lastname"),
         ("c.creationdate", "cdate")],
    ))
    _ic11_sel = [("p2.id", "p2id"), ("p2.firstname", "firstname"),
                 ("p2.lastname", "lastname"), ("o.name", "orgname"),
                 ("pc.workfrom", "workfrom")]
    qs.append(_q(
        "IC11-1",
        [T("p1", "person"), T("k1", "knows"), T("p2", "person"),
         T("pc", "person_company"), T("o", "organisation"), T("pl", "place")],
        [J("o.placeid", "pl.placeid"), J("pc.organisationid", "o.organisationid"),
         J("p2.personid", "pc.personid"), J("k1.person2id", "p2.personid"),
         J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "pc.workfrom < 2016", "pl.name = 'China'"],
        _ic11_sel,
    ))
    qs.append(_q(
        "IC11-2",
        [T("p1", "person"), T("k1", "knows"), T("k2", "knows"), T("p2", "person"),
         T("pc", "person_company"), T("o", "organisation"), T("pl", "place")],
        [J("o.placeid", "pl.placeid"), J("pc.organisationid", "o.organisationid"),
         J("p2.personid", "pc.personid"), J("k2.person2id", "p2.personid"),
         J("k1.person2id", "k2.person1id"), J("p1.personid", "k1.person1id")],
        ["p1.id = 933", "pc.workfrom < 2016", "pl.name = 'China'"],
        _ic11_sel,
    ))
    qs.append(_q(
        "IC12",
        [T("p1", "person"), T("k", "knows"), T("fr", "person"), T("c", "comment"),
         T("ps", "post"), T("mt", "post_tag"), T("t", "tag"),
         T("tc1", "tagclass"), T("tc2", "tagclass")],
        [J("tc1.subclassoftagclassid", "tc2.tagclassid"),
         J("t.tagclassid", "tc1.tagclassid"), J("mt.tagid", "t.tagid"),
         J("c.replyof_post", "ps.id"), J("c.creatorid", "fr.personid"),
         J("ps.id", "mt.messageid"), J("k.person2id", "fr.personid"),
         J("p1.personid", "k.person1id")],
        ["p1.id = 933", "tc2.name = 'Person'"],
        [("fr.personid", "frid"), ("fr.firstname", "firstname"),
         ("fr.lastname", "lastname")],
    ))
    return {q.name: q for q in qs}
