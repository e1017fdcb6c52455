"""Dataset generator tests: schemas, FK integrity, determinism, scaling, and
the presence of every constant the benchmark queries depend on."""
import numpy as np
import pandas as pd
import pytest

from repro.data.imdb import imdb_tables
from repro.data.snb import COMMENT_A, COMMENT_B, PERSON_933, snb_tables
from repro.data.tpch import tpch_tables


# ------------------------------------------------------------------ SNB-lite
def test_snb_schema_complete():
    t = snb_tables(scale=0.003)
    assert set(t) == {
        "place", "person", "knows", "forum", "post", "comment", "tagclass",
        "tag", "post_tag", "organisation", "person_company", "forum_person",
        "likes_comment",
    }


def test_snb_query_constants_exist():
    t = snb_tables(scale=0.003)
    assert PERSON_933 in set(t["person"]["id"])
    assert COMMENT_A in set(t["comment"]["id"]) and COMMENT_B in set(t["comment"]["id"])
    assert "Rahul" in set(t["person"]["firstname"])
    assert {"India", "China"} <= set(t["place"]["name"])
    assert "Rumi" in set(t["tag"]["name"])
    assert "Person" in set(t["tagclass"]["name"])


def test_snb_fk_integrity():
    t = snb_tables(scale=0.003)
    persons = set(t["person"]["personid"])
    assert set(t["knows"]["person1id"]) <= persons
    assert set(t["knows"]["person2id"]) <= persons
    assert set(t["comment"]["creatorid"]) <= persons
    assert set(t["comment"]["replyof_post"]) <= set(t["post"]["id"])
    assert set(t["comment"]["replyof_comment"]) <= set(t["comment"]["id"])
    assert set(t["likes_comment"]["messageid"]) <= set(t["comment"]["id"])
    assert set(t["post_tag"]["messageid"]) <= set(t["post"]["id"])


def test_snb_relationship_dominates_entities():
    t = snb_tables(scale=0.01)
    assert len(t["knows"]) >= 10 * len(t["person"])
    assert len(t["comment"]) >= 15 * len(t["person"])


def test_snb_person_933_has_high_degree():
    t = snb_tables(scale=0.01)
    rid_933 = t["person"].index[t["person"]["id"] == PERSON_933][0]
    deg = (t["knows"]["person1id"] == rid_933).sum()
    avg = len(t["knows"]) / len(t["person"])
    assert deg > avg  # skew puts the seeded person in the dense region


def test_snb_deterministic():
    a, b = snb_tables(scale=0.003, seed=7), snb_tables(scale=0.003, seed=7)
    for k in a:
        pd.testing.assert_frame_equal(a[k], b[k])


def test_snb_scaling():
    small, big = snb_tables(scale=0.003), snb_tables(scale=0.006)
    assert len(big["person"]) > len(small["person"])
    assert len(big["knows"]) > len(small["knows"])


# ----------------------------------------------------------------- IMDB-lite
def test_imdb_schema_complete():
    t = imdb_tables(scale=0.002)
    assert set(t) == {
        "kind_type", "title", "company_type", "company_name", "movie_companies",
        "info_type", "movie_info", "movie_info_idx", "keyword", "movie_keyword",
        "name", "cast_info",
    }


def test_imdb_fk_integrity():
    t = imdb_tables(scale=0.002)
    titles = set(t["title"]["id"])
    assert set(t["movie_companies"]["movie_id"]) <= titles
    assert set(t["movie_companies"]["company_id"]) <= set(t["company_name"]["id"])
    assert set(t["movie_keyword"]["keyword_id"]) <= set(t["keyword"]["id"])
    assert set(t["cast_info"]["person_id"]) <= set(t["name"]["id"])
    assert set(t["title"]["kind_id"]) <= set(t["kind_type"]["id"])
    assert set(t["movie_info"]["info_type_id"]) <= set(t["info_type"]["id"])


def test_imdb_query_constants_exist():
    t = imdb_tables(scale=0.002)
    kws = set(t["keyword"]["keyword"])
    for kw in ["sequel", "marvel-cinematic-universe", "based-on-novel", "murder",
               "character-name-in-title", "female-nudity", "kw-40", "kw-88"]:
        assert kw in kws, kw
    assert "rating" in set(t["info_type"]["info"])
    assert "production companies" in set(t["company_type"]["kind"])
    assert "[de]" in set(t["company_name"]["country_code"])


def test_imdb_link_tables_are_many_to_many():
    t = imdb_tables(scale=0.002)
    assert len(t["cast_info"]) >= 5 * len(t["title"])
    assert t["movie_companies"]["movie_id"].duplicated().any()
    assert t["movie_companies"]["company_id"].duplicated().any()


def test_imdb_skew_popular_companies():
    t = imdb_tables(scale=0.01)
    counts = t["movie_companies"]["company_id"].value_counts()
    assert counts.iloc[0] > 5 * counts.median()


def test_imdb_deterministic():
    a, b = imdb_tables(scale=0.002, seed=11), imdb_tables(scale=0.002, seed=11)
    for k in a:
        pd.testing.assert_frame_equal(a[k], b[k])


# ------------------------------------------------------------------ TPC-H-lite
def test_tpch_schema_complete():
    t = tpch_tables(sf=0.002)
    assert set(t) == {"region", "nation", "supplier", "customer", "part",
                      "partsupp", "orders", "lineitem"}


def test_tpch_row_counts_track_sf():
    t = tpch_tables(sf=0.002)
    assert len(t["lineitem"]) == 12_000
    assert len(t["orders"]) == 3_000
    assert len(t["nation"]) == 25 and len(t["region"]) == 5


def test_tpch_fk_integrity():
    t = tpch_tables(sf=0.002)
    assert set(t["lineitem"]["l_orderkey"]) <= set(t["orders"]["o_orderkey"])
    assert set(t["lineitem"]["l_suppkey"]) <= set(t["supplier"]["s_suppkey"])
    assert set(t["orders"]["o_custkey"]) <= set(t["customer"]["c_custkey"])
    assert set(t["partsupp"]["ps_partkey"]) <= set(t["part"]["p_partkey"])
    assert set(t["nation"]["n_regionkey"]) <= set(t["region"]["r_regionkey"])


def test_tpch_query_constants_exist():
    t = tpch_tables(sf=0.002)
    assert "EUROPE" in set(t["region"]["r_name"])
    assert "GERMANY" in set(t["nation"]["n_name"])
    assert "MED BOX" in set(t["part"]["p_container"])
    assert t["part"]["p_name"].str.contains("forest").any()
    assert {"MAIL", "SHIP"} <= set(t["lineitem"]["l_shipmode"])


def test_tpch_dates_are_timestamps():
    t = tpch_tables(sf=0.002)
    for col in ["l_shipdate", "l_commitdate", "l_receiptdate"]:
        assert np.issubdtype(t["lineitem"][col].dtype, np.datetime64)
    assert np.issubdtype(t["orders"]["o_orderdate"].dtype, np.datetime64)


def test_tpch_deterministic():
    a, b = tpch_tables(sf=0.002, seed=21), tpch_tables(sf=0.002, seed=21)
    for k in a:
        pd.testing.assert_frame_equal(a[k], b[k])
