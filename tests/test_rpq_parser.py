"""UCRPQ parser tests, including every query of the paper's Figs. 5–6."""
import pytest

from repro.core.paper_queries import ALL_QUERIES, UNIPROT_QUERIES, YAGO_QUERIES, query_classes
from repro.core.rpq import (
    Alt,
    Atom,
    CRPQ,
    Label,
    ParseError,
    Plus,
    Seq,
    distribute_alts,
    is_var,
    parse_query,
    parse_rx,
    var_col,
)


class TestRegexParser:
    def test_label(self):
        assert parse_rx("a") == Label("a")

    def test_inverse(self):
        assert parse_rx("-a") == Label("a", inverse=True)

    def test_seq(self):
        assert parse_rx("a/b") == Seq((Label("a"), Label("b")))

    def test_plus(self):
        assert parse_rx("a+") == Plus(Label("a"))

    def test_plus_binds_tighter_than_seq(self):
        assert parse_rx("a+/b") == Seq((Plus(Label("a")), Label("b")))

    def test_group_plus(self):
        assert parse_rx("(a/b)+") == Plus(Seq((Label("a"), Label("b"))))

    def test_alt_pipe(self):
        assert parse_rx("(a|b)") == Alt((Label("a"), Label("b")))

    def test_alt_space_separated(self):
        # The paper writes space-separated alternatives: (isL dw subClassOf)
        assert parse_rx("(a b c)") == Alt((Label("a"), Label("b"), Label("c")))

    def test_alt_of_seqs(self):
        rx = parse_rx("(a/b | c)")
        assert rx == Alt((Seq((Label("a"), Label("b"))), Label("c")))

    def test_inverse_inside_group(self):
        assert parse_rx("(enc/-enc)+") == Plus(Seq((Label("enc"), Label("enc", True))))

    def test_colon_label(self):
        assert parse_rx("rdfs:subClassOf") == Label("rdfs:subClassOf")

    def test_nested_plus(self):
        assert parse_rx("(a+/b)+") == Plus(Seq((Plus(Label("a")), Label("b"))))

    def test_trailing_garbage(self):
        with pytest.raises(ParseError):
            parse_rx("a/b)")

    def test_empty(self):
        with pytest.raises(ParseError):
            parse_rx("")

    def test_double_plus(self):
        assert parse_rx("a++") == Plus(Plus(Label("a")))


class TestQueryParser:
    def test_simple(self):
        q = parse_query("?x, ?y <- ?x a+ ?y")
        assert q == CRPQ(("?x", "?y"), (Atom("?x", Plus(Label("a")), "?y"),))

    def test_constant_endpoints(self):
        q = parse_query("?x <- ?x a+ Japan")
        assert q.atoms[0].obj == "Japan"

    def test_numeric_constant(self):
        q = parse_query("?x <- 42 a+ ?x")
        assert q.atoms[0].subj == "42"

    def test_conjunction(self):
        q = parse_query("?a, ?c <- ?a x+ Japan, ?a y+ ?c")
        assert len(q.atoms) == 2

    def test_head_must_be_vars(self):
        with pytest.raises(ParseError):
            parse_query("Japan <- ?x a+ Japan")

    def test_missing_arrow(self):
        with pytest.raises(ParseError):
            parse_query("?x ?x a+ ?y")

    def test_var_col(self):
        assert var_col("?foo") == "v_foo"
        assert is_var("?foo") and not is_var("foo")


@pytest.mark.parametrize("qid", sorted(ALL_QUERIES))
def test_paper_query_parses(qid):
    q = parse_query(ALL_QUERIES[qid])
    assert isinstance(q, CRPQ)
    assert q.head
    assert q.atoms


@pytest.mark.parametrize("qid", sorted(ALL_QUERIES))
def test_paper_query_is_recursive_and_classified(qid):
    cls = query_classes(ALL_QUERIES[qid])
    assert "C1" in cls  # every paper query contains at least one closure


class TestClasses:
    @pytest.mark.parametrize(
        "query,expected",
        [
            ("?x, ?y <- ?x a+ ?y", {"C1"}),
            ("?x <- ?x a+ C", {"C1", "C2"}),
            ("?x <- C a+ ?x", {"C1", "C3"}),
            ("?x, ?y <- ?x a+/b ?y", {"C1", "C4"}),
            ("?x, ?y <- ?x b/a+ ?y", {"C1", "C5"}),
            ("?x, ?y <- ?x a+/b+ ?y", {"C1", "C6"}),
            ("?x <- C a/b+ ?x", {"C1", "C3", "C5"}),  # the paper's example
        ],
    )
    def test_structural_classes(self, query, expected):
        assert query_classes(query) == frozenset(expected)


class TestDistributeAlts:
    def test_no_alt(self):
        assert distribute_alts(parse_rx("a/b+")) == [parse_rx("a/b+")]

    def test_top_alt(self):
        assert set(map(str, distribute_alts(parse_rx("(a|b)")))) == {"a", "b"}

    def test_alt_in_seq(self):
        out = distribute_alts(parse_rx("x/(a|b)/y"))
        assert {str(o) for o in out} == {"x/a/y", "x/b/y"}

    def test_alt_under_plus_not_distributed(self):
        out = distribute_alts(parse_rx("(a|b)+"))
        assert out == [parse_rx("(a|b)+")]

    def test_nested_mixed(self):
        out = distribute_alts(parse_rx("(a|b)/(c|d)"))
        assert len(out) == 4

    def test_dedupe(self):
        out = distribute_alts(parse_rx("(a|a)"))
        assert out == [Label("a")]
