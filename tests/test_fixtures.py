"""The fixtures must reproduce the paper's published index entries
(Examples 3.1–3.3) exactly: quintuples ``(x, y, u-v, d)``, entity triples,
and PL-index posting lists."""
import pandas as pd
import pytest

from repro.corpus import fixtures


@pytest.fixture(scope="module")
def rows() -> pd.DataFrame:
    return fixtures.paper_rows()


def quint(rows: pd.DataFrame, sid: int, tid: int) -> tuple:
    r = rows[(rows.sid == sid) & (rows.tid == tid)].iloc[0]
    return (int(r.sid), int(r.tid), int(r.sub_lo), int(r.sub_hi), int(r.depth))


class TestWordIndexQuintuples:
    """Example 3.2, word index column."""

    def test_I(self, rows):
        assert quint(rows, 0, 0) == (0, 0, 0, 0, 1)

    def test_ate_sentence1(self, rows):
        assert quint(rows, 1, 1) == (1, 1, 0, 12, 0)

    def test_ate_sentence0(self, rows):
        assert quint(rows, 0, 1) == (0, 1, 0, 16, 0)

    def test_delicious_sentence1(self, rows):
        assert quint(rows, 1, 3) == (1, 3, 3, 3, 2)

    def test_delicious_sentence0(self, rows):
        assert quint(rows, 0, 9) == (0, 9, 9, 9, 3)

    def test_cream(self, rows):
        assert quint(rows, 0, 5) == (0, 5, 2, 9, 1)

    def test_anna(self, rows):
        assert quint(rows, 1, 0) == (1, 0, 0, 0, 1)

    def test_cheesecake(self, rows):
        assert quint(rows, 1, 4) == (1, 4, 2, 11, 1)

    def test_some(self, rows):
        assert quint(rows, 1, 2) == (1, 2, 2, 2, 2)

    def test_chocolate_and_ice(self, rows):
        assert quint(rows, 0, 3) == (0, 3, 3, 3, 2)
        assert quint(rows, 0, 4) == (0, 4, 4, 4, 2)


class TestEntities:
    """Example 3.2, entity index column."""

    def ents(self, rows):
        e = rows[(rows.etype.notna()) & (rows.tid == rows.ent_lo)]
        return {(r.ent_text): (int(r.sid), int(r.ent_lo), int(r.ent_hi)) for _, r in e.iterrows()}

    def test_cheesecake(self, rows):
        assert self.ents(rows)["cheesecake"] == (1, 4, 4)

    def test_grocery_store(self, rows):
        assert self.ents(rows)["grocery store"] == (1, 10, 11)

    def test_chocolate_ice_cream(self, rows):
        assert self.ents(rows)["chocolate ice cream"] == (0, 3, 5)


class TestPLPaths:
    """Example 3.3, PL-index posting lists (path → member tokens)."""

    def members(self, rows, path):
        sub = rows[rows.pl_path == path]
        return sorted((r.token, int(r.sid), int(r.tid)) for _, r in sub.iterrows())

    def test_root(self, rows):
        assert self.members(rows, "/root") == [("ate", 0, 1), ("ate", 1, 1)]

    def test_nsubj(self, rows):
        assert self.members(rows, "/root/nsubj") == [("Anna", 1, 0), ("I", 0, 0)]

    def test_dobj(self, rows):
        assert self.members(rows, "/root/dobj") == [
            ("cheesecake", 1, 4),
            ("cream", 0, 5),
        ]

    def test_dobj_det(self, rows):
        assert self.members(rows, "/root/dobj/det") == [("a", 0, 2), ("some", 1, 2)]

    def test_dobj_amod(self, rows):
        assert self.members(rows, "/root/dobj/amod") == [("delicious", 1, 3)]

    def test_dobj_nn_merged(self, rows):
        # Both nn nodes under dobj merged: posting list holds chocolate+ice.
        assert self.members(rows, "/root/dobj/nn") == [
            ("chocolate", 0, 3),
            ("ice", 0, 4),
        ]

    def test_delicious_not_under_amod_in_s0(self, rows):
        # Sentence 0's "delicious" sits deeper (depth 3) — not an amod child.
        s0 = rows[(rows.sid == 0) & (rows.token == "delicious")].iloc[0]
        assert s0.pl_path != "/root/dobj/amod"
        assert int(s0.depth) == 3


class TestEx22:
    def test_two_docs(self):
        rows = fixtures.ex22_rows()
        assert set(rows.doc_id.unique()) == {0, 1}
        s1 = rows[rows.doc_id == 0]
        assert {"China", "Japan"} <= set(s1.token)
        s2 = rows[rows.doc_id == 1]
        assert {"Beijing", "Tokyo"} <= set(s2.token)

    def test_gpe_entities(self):
        rows = fixtures.ex22_rows()
        gpe = rows[(rows.etype == "GPE") & (rows.tid == rows.ent_lo)]
        assert sorted(gpe.ent_text) == ["Beijing", "China", "Japan", "Tokyo"]
