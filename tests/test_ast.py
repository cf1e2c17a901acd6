"""Tests for the Datalog AST and parser (repro.core.ast)."""
import pytest

from repro.core.ast import (
    Atom,
    Comparison,
    Const,
    Program,
    Rule,
    Var,
    check_safe,
    parse_program,
    parse_rule,
    vars_in_order,
)


class TestParser:
    def test_simple_rule(self):
        r = parse_rule("Q(X, Y) :- R(X, Z), S(Z, Y).")
        assert r.head == Atom("Q", (Var("X"), Var("Y")))
        assert len(r.body) == 2
        assert r.body[0].pred == "R" and r.body[1].pred == "S"

    def test_negated_goal(self):
        r = parse_rule("Q(X) :- R(X), not S(X).")
        assert not r.body[0].negated
        assert r.body[1].negated

    def test_negation_unicode(self):
        r = parse_rule("Q(X) :- R(X), ¬ S(X).")
        assert r.body[1].negated

    def test_string_constant_quoted(self):
        r = parse_rule("Q(X) :- R(X, 'queen anne').")
        assert r.body[0].args[1] == Const("queen anne")

    def test_bare_lowercase_is_constant(self):
        r = parse_rule("Q(X) :- R(X, shared).")
        assert r.body[0].args[1] == Const("shared")

    def test_int_constant(self):
        r = parse_rule("Q(X) :- R(X, 42).")
        assert r.body[0].args[1] == Const(42)

    def test_negative_int_constant(self):
        r = parse_rule("Q(X) :- R(X, -1).")
        assert r.body[0].args[1] == Const(-1)

    def test_float_constant(self):
        r = parse_rule("Q(X) :- R(X, 3.5).")
        assert r.body[0].args[1] == Const(3.5)

    def test_comparison_lt(self):
        r = parse_rule("Q(X) :- R(X, Y), X < Y.")
        assert r.comparisons == (Comparison(Var("X"), "<", Var("Y")),)

    def test_comparison_all_ops(self):
        for op in ("<", "<=", "!=", ">=", ">", "="):
            r = parse_rule(f"Q(X) :- R(X, Y), X {op} Y.")
            assert r.comparisons[0].op == op

    def test_comparison_with_constant(self):
        r = parse_rule("Q(X) :- R(X, Y), Y >= 4.")
        assert r.comparisons[0].right == Const(4)

    def test_trailing_period_optional(self):
        assert parse_rule("Q(X) :- R(X)") == parse_rule("Q(X) :- R(X).")

    def test_rule_id(self):
        r = parse_rule("Q(X) :- R(X).", rule_id="r7")
        assert r.rule_id == "r7"

    def test_airbnb_rule_r1(self):
        r = parse_rule(
            "AL(N, R) :- LISTING(I, N, T, R, 'queen anne', E), "
            "AVAILABILITY(I, '2016-11-09', P)."
        )
        assert [v.name for v in vars_in_order(r)] == ["N", "R", "I", "T", "E", "P"]

    def test_unsafe_rule_raises(self):
        with pytest.raises(ValueError, match="unsafe"):
            parse_rule("Q(X, Y) :- R(X).")

    def test_unsafe_comparison_var_raises(self):
        with pytest.raises(ValueError, match="unsafe"):
            parse_rule("Q(X) :- R(X), Y < 3.")

    def test_unsafe_negated_only_raises(self):
        with pytest.raises(ValueError, match="unsafe"):
            parse_rule("Q(X) :- R(X), not S(Y).")

    def test_garbage_raises(self):
        with pytest.raises(ValueError):
            parse_rule("Q(X) :- ")

    def test_bad_operator_raises(self):
        with pytest.raises(ValueError):
            parse_rule("Q(X) :- R(X), X ~ 3.")


class TestProgram:
    def test_single_rule_program(self):
        p = parse_program("Q(X) :- R(X).")
        assert p.head_pred == "Q"
        assert p.head_arity == 1

    def test_union_rule_ids(self):
        p = parse_program("Q(X) :- R(X).", "Q(X) :- S(X).", name="r4")
        assert [r.rule_id for r in p.rules] == ["r4", "r4_2"]

    def test_mismatched_heads_raise(self):
        r1 = parse_rule("Q(X) :- R(X).")
        r2 = parse_rule("P(X) :- R(X).")
        with pytest.raises(ValueError, match="head predicate"):
            Program((r1, r2))

    def test_mismatched_arity_raises(self):
        r1 = parse_rule("Q(X) :- R(X).")
        r2 = parse_rule("Q(X, Y) :- R(X, Y).")
        with pytest.raises(ValueError, match="arity"):
            Program((r1, r2))

    def test_empty_program_raises(self):
        with pytest.raises(ValueError):
            Program(())


class TestAst:
    def test_vars_in_order_head_first(self):
        r = parse_rule("Q(B, A) :- R(A, B, C).")
        assert [v.name for v in vars_in_order(r)] == ["B", "A", "C"]

    def test_vars_in_order_comparison_last(self):
        # comparison variables must already occur positively (safety)
        r = parse_rule("Q(X) :- R(X, Y), X < Y.")
        assert [v.name for v in vars_in_order(r)] == ["X", "Y"]

    def test_atom_vars_with_duplicates(self):
        a = Atom("R", (Var("X"), Const(1), Var("X")))
        assert a.vars() == [Var("X"), Var("X")]

    def test_comparison_eval_const(self):
        assert Comparison(Const(1), "<", Const(2)).eval_const()
        assert not Comparison(Const(2), "<", Const(1)).eval_const()
        assert Comparison(Const("a"), "!=", Const("b")).eval_const()
        assert Comparison(Const(3), "=", Const(3)).eval_const()

    def test_comparison_eval_const_requires_consts(self):
        with pytest.raises(ValueError):
            Comparison(Var("X"), "<", Const(2)).eval_const()

    def test_comparison_bad_op(self):
        with pytest.raises(ValueError):
            Comparison(Var("X"), "~", Const(2))

    def test_negated_head_raises(self):
        with pytest.raises(ValueError):
            Rule(Atom("Q", (Var("X"),), negated=True), (Atom("R", (Var("X"),)),))

    def test_empty_body_raises(self):
        with pytest.raises(ValueError):
            Rule(Atom("Q", (Var("X"),)), ())

    def test_positive_negative_split(self):
        r = parse_rule("Q(X) :- R(X), not S(X), T(X).")
        assert [a.pred for a in r.positive_body()] == ["R", "T"]
        assert [a.pred for a in r.negative_body()] == ["S"]

    def test_check_safe_ok(self):
        check_safe(parse_rule("Q(X) :- R(X, Y), not S(Y)."))

    def test_rule_vars(self):
        r = parse_rule("Q(X) :- R(X, Y), Y < 4.")
        assert r.vars() == {Var("X"), Var("Y")}
