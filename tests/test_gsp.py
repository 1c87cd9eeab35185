"""Generate Skip Plan (Algorithm 2) unit tests."""
from repro.koko.ast import SpanDef, elastic, tokens_atom, var_atom
from repro.koko.gsp import atom_cost, skip_list


def _named_elastic(name):
    from dataclasses import replace
    return replace(elastic(), var=name)


class TestAtomCost:
    def test_elastic_is_t_t1_over_2(self):
        assert atom_cost(_named_elastic("v_1"), {}, 10) == 55

    def test_entity_elastic_uses_bindings(self):
        from dataclasses import replace
        a = replace(elastic(etype="Entity"), var="v_1")
        assert atom_cost(a, {"v_1": 2}, 10) == 2

    def test_var_uses_bindings(self):
        assert atom_cost(var_atom("a"), {"a": 3}, 10) == 3


class TestSkipList:
    def test_example_41_skips_both_elastics(self):
        # e = a + ^ + b + ^ + c with small binding counts and large t
        sd = SpanDef(
            "e",
            [var_atom("a"), _named_elastic("v_1"), var_atom("b"),
             _named_elastic("v_2"), var_atom("c")],
        )
        skips = skip_list(sd, {"a": 2, "b": 1, "c": 1}, 20)
        assert set(skips) == {"v_1", "v_2"}

    def test_no_adjacent_skips(self):
        sd = SpanDef("e", [var_atom("a"), var_atom("b"), var_atom("c")])
        skips = skip_list(sd, {"a": 100, "b": 90, "c": 80}, 5)
        # a skipped first (cost 100); b blocked (neighbour skipped); c ok.
        assert skips == ["a", "c"]

    def test_single_atom_never_skipped(self):
        sd = SpanDef("e", [var_atom("a")])
        assert skip_list(sd, {"a": 1000}, 50) == []

    def test_greedy_order_is_cost_descending(self):
        sd = SpanDef(
            "e",
            [var_atom("a"), _named_elastic("v_1"), var_atom("b")],
        )
        skips = skip_list(sd, {"a": 1, "b": 2}, 30)
        assert skips[0] == "v_1"  # costliest first

    def test_tokens_atom_counts_as_present_neighbour(self):
        sd = SpanDef("e", [tokens_atom("the"), var_atom("a"), var_atom("b")])
        skips = skip_list(sd, {"a": 50, "b": 1}, 5)
        assert "a" in skips
