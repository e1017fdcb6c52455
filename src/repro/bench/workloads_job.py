"""JOB-lite: 33 queries mirroring the Join Order Benchmark's query groups.

The real JOB has 113 queries in 33 groups over the IMDB snapshot; the paper's
Table 4 reports the first variant of each group (Q1a…Q33a). We reproduce that
granularity: 33 queries over the IMDB-lite schema, preserving JOB's defining
features — ``SELECT MIN(...)`` aggregates, chains/stars of many-to-many link
tables (movie_companies / movie_keyword / cast_info / movie_info) around
``title``, and per-query predicates ranging from highly selective (a rare
keyword or country code: the Q6a/Q21a/Q27a-style big-win queries) to barely
selective (the Q5a/Q20a-style ~1x queries).

Aliases follow JOB: t=title, mc=movie_companies, cn=company_name,
ct=company_type, mi=movie_info, it=info_type, midx=movie_info_idx, k=keyword,
mk=movie_keyword, ci=cast_info, n=name, kt=kind_type.
"""
from __future__ import annotations

from repro.plan.spec import JoinEdge, QuerySpec, TableRef

T, J = TableRef, JoinEdge.of

# Reusable join fragments (all predefined in imdb_catalog).
_T_MC_CN = [J("t.id", "mc.movie_id"), J("mc.company_id", "cn.id")]
_T_MK_K = [J("t.id", "mk.movie_id"), J("mk.keyword_id", "k.id")]
_T_CI_N = [J("t.id", "ci.movie_id"), J("ci.person_id", "n.id")]
_T_MI_IT = [J("t.id", "mi.movie_id"), J("mi.info_type_id", "it.id")]
_T_MIDX_IT2 = [J("t.id", "midx.movie_id"), J("midx.info_type_id", "it2.id")]


def _q(name, tables, joins, filters, select=None) -> QuerySpec:
    return QuerySpec(
        name=name, tables=tables, joins=joins, filters=filters,
        select=select or [("min(t.title)", "min_title")], group_by=[],
    )


def specs() -> dict[str, QuerySpec]:
    t, mc, cn, ct = T("t", "title"), T("mc", "movie_companies"), T("cn", "company_name"), T("ct", "company_type")
    mi, it, midx, it2 = T("mi", "movie_info"), T("it", "info_type"), T("midx", "movie_info_idx"), T("it2", "info_type")
    k, mk, ci, n, kt = T("k", "keyword"), T("mk", "movie_keyword"), T("ci", "cast_info"), T("n", "name"), T("kt", "kind_type")
    qs = [
        _q("Q1a", [ct, t, mc, cn],
           _T_MC_CN + [J("mc.company_type_id", "ct.id")],
           ["ct.kind = 'production companies'", "cn.country_code = '[de]'",
            "t.production_year > 2005", "t.production_year < 2010"]),
        _q("Q2a", [t, mc, cn], _T_MC_CN,
           ["cn.country_code = '[nl]'", "t.production_year > 2000"]),
        _q("Q3a", [t, mk, k], _T_MK_K,
           ["k.keyword = 'kw-40'", "t.production_year > 2005"]),
        _q("Q4a", [t, midx, it2], _T_MIDX_IT2,
           ["it2.info = 'rating'", "midx.info > '8.0'", "t.production_year > 2008"],
           [("min(midx.info)", "min_rating")]),
        # Q5a: no selective predicate anywhere — the paper's ~1x case.
        _q("Q5a", [t, mc, mi], [J("t.id", "mc.movie_id"), J("t.id", "mi.movie_id")],
           ["t.production_year > 1960", "mi.info in ('Drama', 'Comedy', 'Action')"]),
        _q("Q6a", [t, mk, k, ci, n], _T_MK_K + _T_CI_N,
           ["k.keyword = 'marvel-cinematic-universe'", "n.name like 'Actor 19%'"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q7a", [t, ci, n, mi, it], _T_CI_N + _T_MI_IT,
           ["it.info = 'mpaa'", "n.name like 'Actor 42%'",
            "t.production_year > 1990"]),
        _q("Q8a", [t, mc, cn, ci, n], _T_MC_CN + _T_CI_N,
           ["cn.country_code = '[jp]'", "ci.note = '(voice)'"],
           [("min(n.name)", "min_name")]),
        _q("Q9a", [t, mc, cn, ci, n], _T_MC_CN + _T_CI_N,
           ["cn.country_code = '[us]'", "ci.note = '(producer)'",
            "n.gender = 'f'"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q10a", [t, mc, cn, ci], [J("t.id", "mc.movie_id"),
                                     J("mc.company_id", "cn.id"),
                                     J("t.id", "ci.movie_id")],
           ["cn.country_code = '[it]'", "ci.note like '(producer%'"]),
        _q("Q11a", [t, mc, cn, ct, mk, k],
           _T_MC_CN + _T_MK_K + [J("mc.company_type_id", "ct.id")],
           ["cn.country_code = '[se]'", "ct.kind = 'distributors'",
            "k.keyword = 'sequel'", "t.production_year > 1995"]),
        _q("Q12a", [t, mc, cn, ct, mi, it],
           _T_MC_CN + _T_MI_IT + [J("mc.company_type_id", "ct.id")],
           ["cn.country_code = '[fr]'", "ct.kind = 'production companies'",
            "it.info = 'genres'", "mi.info = 'Horror'"]),
        _q("Q13a", [t, mi, it, midx, it2], _T_MI_IT + _T_MIDX_IT2,
           ["it.info = 'countries'", "it2.info = 'rating'", "mi.info = 'Germany'",
            "midx.info > '7.5'"],
           [("min(midx.info)", "min_rating"), ("min(t.title)", "min_title")]),
        _q("Q14a", [t, mi, it, midx, it2, kt],
           _T_MI_IT + _T_MIDX_IT2 + [J("t.kind_id", "kt.id")],
           ["kt.kind = 'movie'", "it.info = 'countries'", "it2.info = 'rating'",
            "mi.info = 'Sweden'", "midx.info < '3.5'"],
           [("min(midx.info)", "min_rating"), ("min(t.title)", "min_title")]),
        _q("Q15a", [t, mc, cn, mi, it], _T_MC_CN + _T_MI_IT,
           ["cn.country_code = '[gb]'", "it.info = 'release dates'",
            "t.production_year > 2000"],
           [("min(mi.info)", "min_info")]),
        _q("Q16a", [t, mc, cn, mk, k], _T_MC_CN + _T_MK_K,
           ["cn.country_code = '[pl]'", "k.keyword = 'character-name-in-title'"],
           [("min(t.title)", "min_title")]),
        _q("Q17a", [t, mk, k, ci, n], _T_MK_K + _T_CI_N,
           ["k.keyword = 'character-name-in-title'", "n.name like 'Actor 1%'"],
           [("min(n.name)", "min_name")]),
        _q("Q18a", [t, ci, n, midx, it2], _T_CI_N + _T_MIDX_IT2,
           ["ci.note = '(producer)'", "n.gender = 'm'", "it2.info = 'votes'"],
           [("min(midx.info)", "min_votes"), ("min(t.title)", "min_title")]),
        _q("Q19a", [t, ci, n, mc, cn, mi, it],
           _T_CI_N + _T_MC_CN + _T_MI_IT,
           ["cn.country_code = '[us]'", "it.info = 'release dates'",
            "ci.note = '(voice)'", "n.gender = 'f'", "t.production_year > 2000"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        # Q20a: the other near-1x query — predicates barely filter anything.
        _q("Q20a", [t, kt, ci, n],
           _T_CI_N + [J("t.kind_id", "kt.id")],
           ["kt.kind in ('movie', 'tv series', 'tv movie')",
            "t.production_year > 1950"],
           [("min(t.title)", "min_title")]),
        _q("Q21a", [t, mc, cn, ct, mk, k],
           _T_MC_CN + _T_MK_K + [J("mc.company_type_id", "ct.id")],
           ["cn.country_code = '[nl]'", "ct.kind = 'production companies'",
            "k.keyword = 'kw-55'", "t.production_year < 1965"]),
        _q("Q22a", [t, mc, cn, mk, k, mi, it],
           _T_MC_CN + _T_MK_K + _T_MI_IT,
           ["cn.country_code != '[us]'", "k.keyword = 'murder'",
            "it.info = 'countries'", "mi.info = 'Germany'",
            "t.production_year > 2008"]),
        _q("Q23a", [t, kt, mi, it, mc], _T_MI_IT + [J("t.kind_id", "kt.id"),
                                                    J("t.id", "mc.movie_id")],
           ["kt.kind = 'movie'", "it.info = 'release dates'",
            "t.production_year > 2010"]),
        _q("Q24a", [t, ci, n, mk, k, mc, cn],
           _T_CI_N + _T_MK_K + _T_MC_CN,
           ["k.keyword = 'based-on-novel'", "n.gender = 'f'",
            "cn.country_code = '[us]'", "t.production_year > 2005"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q25a", [t, ci, n, mi, it, mk, k],
           _T_CI_N + _T_MI_IT + _T_MK_K,
           ["k.keyword = 'female-nudity'", "it.info = 'genres'",
            "mi.info = 'Horror'", "n.gender = 'm'"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q26a", [t, ci, n, kt, midx, it2],
           _T_CI_N + _T_MIDX_IT2 + [J("t.kind_id", "kt.id")],
           ["kt.kind = 'movie'", "it2.info = 'rating'", "midx.info > '7.0'",
            "n.name like 'Actor 3%'"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q27a", [t, mc, cn, ct, mk, k],
           _T_MC_CN + _T_MK_K + [J("mc.company_type_id", "ct.id")],
           ["cn.country_code = '[se]'", "ct.kind = 'production companies'",
            "k.keyword = 'kw-70'", "t.production_year > 1980"]),
        _q("Q28a", [t, kt, mi, it, mk, k],
           _T_MI_IT + _T_MK_K + [J("t.kind_id", "kt.id")],
           ["kt.kind = 'tv movie'", "k.keyword = 'kw-33'",
            "it.info = 'countries'", "mi.info = 'Sweden'"]),
        _q("Q29a", [t, ci, n, mi, it, mk, k],
           _T_CI_N + _T_MI_IT + _T_MK_K,
           ["k.keyword = 'kw-12'", "it.info = 'release dates'",
            "n.gender = 'f'", "t.production_year > 2000"],
           [("min(n.name)", "min_name")]),
        _q("Q30a", [t, mi, it, mk, k, ci, n],
           _T_MI_IT + _T_MK_K + _T_CI_N,
           ["k.keyword = 'murder'", "it.info = 'genres'", "mi.info = 'Thriller'",
            "n.gender = 'm'", "t.production_year > 2005"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q31a", [t, mi, it, mk, k, ci, n],
           _T_MI_IT + _T_MK_K + _T_CI_N,
           ["k.keyword = 'kw-21'", "it.info = 'genres'", "mi.info = 'Sci-Fi'",
            "ci.note = '(writer)'"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
        _q("Q32a", [t, mk, k], _T_MK_K,
           ["k.keyword = 'kw-88'"],
           [("min(t.title)", "min_title")]),
        _q("Q33a", [t, mc, cn, midx, it2],
           _T_MC_CN + _T_MIDX_IT2,
           ["cn.country_code = '[in]'", "it2.info = 'rating'",
            "midx.info < '2.0'"],
           [("min(midx.info)", "min_rating"), ("min(t.title)", "min_title")]),
        # Second variants of Q1–Q6 (different constants, same join shapes) for
        # the plan-spectrum study of Table 7 / §7.3.3.
        _q("Q1b", [ct, t, mc, cn],
           _T_MC_CN + [J("mc.company_type_id", "ct.id")],
           ["ct.kind = 'distributors'", "cn.country_code = '[fr]'",
            "t.production_year > 2010"]),
        _q("Q2b", [t, mc, cn], _T_MC_CN,
           ["cn.country_code = '[se]'", "t.production_year < 1970"]),
        _q("Q3b", [t, mk, k], _T_MK_K,
           ["k.keyword = 'kw-95'", "t.production_year > 1990"]),
        _q("Q4b", [t, midx, it2], _T_MIDX_IT2,
           ["it2.info = 'votes'", "midx.info > '9.0'", "t.production_year > 2010"],
           [("min(midx.info)", "min_votes")]),
        _q("Q5b", [t, mc, mi], [J("t.id", "mc.movie_id"), J("t.id", "mi.movie_id")],
           ["t.production_year > 1970", "mi.info in ('Horror', 'Sci-Fi')"]),
        _q("Q6b", [t, mk, k, ci, n], _T_MK_K + _T_CI_N,
           ["k.keyword = 'based-on-novel'", "n.name like 'Actor 7%'"],
           [("min(n.name)", "min_name"), ("min(t.title)", "min_title")]),
    ]
    return {q.name: q for q in qs}


def first_variants() -> dict[str, "QuerySpec"]:
    """The 33 Q*a queries (the granularity of Tables 3/4)."""
    return {k: v for k, v in specs().items() if k.endswith("a")}


def spectrum_queries() -> dict[str, "QuerySpec"]:
    """Q1a/b–Q6a/b: the 12 queries of the plan-spectrum study (Table 7)."""
    want = [f"Q{i}{v}" for i in range(1, 7) for v in ("a", "b")]
    all_ = specs()
    return {w: all_[w] for w in want}
