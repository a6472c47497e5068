"""Sanity tests of the independent reference evaluator itself, on
hand-constructed graphs with known answers."""
import pytest

from repro.core.reference import eval_crpq, eval_rx_pairs
from repro.core.rpq import parse_query, parse_rx

CHAIN = [(1, "a", 2), (2, "a", 3), (3, "b", 4)]


class TestRx:
    def test_label(self):
        assert eval_rx_pairs(parse_rx("a"), CHAIN) == {(1, 2), (2, 3)}

    def test_inverse(self):
        assert eval_rx_pairs(parse_rx("-a"), CHAIN) == {(2, 1), (3, 2)}

    def test_seq(self):
        assert eval_rx_pairs(parse_rx("a/b"), CHAIN) == {(2, 4)}

    def test_plus(self):
        assert eval_rx_pairs(parse_rx("a+"), CHAIN) == {(1, 2), (2, 3), (1, 3)}

    def test_alt(self):
        assert eval_rx_pairs(parse_rx("(a|b)"), CHAIN) == {(1, 2), (2, 3), (3, 4)}

    def test_alt_plus(self):
        assert eval_rx_pairs(parse_rx("(a|b)+"), CHAIN) == {
            (1, 2), (2, 3), (3, 4), (1, 3), (2, 4), (1, 4),
        }

    def test_cycle(self):
        cyc = [(1, "a", 2), (2, "a", 1)]
        assert eval_rx_pairs(parse_rx("a+"), cyc) == {(1, 2), (2, 1), (1, 1), (2, 2)}


class TestQueries:
    def test_head_projection(self):
        q = parse_query("?y <- ?x a+ ?y")
        assert eval_crpq(q, CHAIN) == {(2,), (3,)}

    def test_const_subject(self):
        q = parse_query("?y <- 1 a+ ?y")
        assert eval_crpq(q, CHAIN) == {(2,), (3,)}

    def test_const_object(self):
        q = parse_query("?x <- ?x a+ 3")
        assert eval_crpq(q, CHAIN) == {(1,), (2,)}

    def test_named_constant(self):
        q = parse_query("?x <- ?x a+ End")
        assert eval_crpq(q, CHAIN, {"End": 3}) == {(1,), (2,)}

    def test_conjunction_join(self):
        q = parse_query("?x, ?z <- ?x a+ ?y, ?y b ?z")
        assert eval_crpq(q, CHAIN) == {(1, 4), (2, 4)}

    def test_same_var_endpoints(self):
        cyc = [(1, "a", 2), (2, "a", 1), (3, "a", 4)]
        q = parse_query("?x <- ?x a+ ?x")
        assert eval_crpq(q, cyc) == {(1,), (2,)}

    def test_cross_product_atoms(self):
        q = parse_query("?x, ?z <- ?x a 2, 3 b ?z")
        got = eval_crpq(q, CHAIN)
        assert got == {(1, 4)}

    def test_empty_result(self):
        q = parse_query("?x <- ?x b/a ?y")
        assert eval_crpq(q, CHAIN) == set()
