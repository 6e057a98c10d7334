"""Cleaning-aware planner tests (paper §5.1, Fig 3)."""
import pytest

from repro.core.constraints import DC, FD, Atom
from repro.core.planner import (
    Aggregate,
    Filter,
    JoinSpec,
    Query,
    build_plan,
    filter_side,
    relevant_rules,
)

PHI = FD(("orderkey",), "suppkey", name="phi")
PSI = FD(("address",), "suppkey", name="psi")
DCR = DC((Atom("extendedprice", "<"), Atom("discount", ">")), name="dc")


class TestQueryAttrs:
    def test_filter_and_project(self):
        q = Query("t", [Filter("a", "=", 1)], project=["b"])
        assert q.attrs() == {"a", "b"}

    def test_groupby_and_aggs(self):
        q = Query("t", group_by=["y"], aggs=[Aggregate("avg", "m", "am")])
        assert q.attrs() == {"y", "m"}

    def test_count_star_excluded(self):
        q = Query("t", aggs=[Aggregate("count", "*", "c")])
        assert q.attrs() == set()

    def test_join_keys(self):
        q = Query("t", join=JoinSpec("s", "k1", "k2", [Filter("z", "=", 1)]))
        assert "k1" in q.attrs("left")
        assert q.attrs("right") == {"k2", "z"}


class TestFilterSide:
    def test_rhs(self):
        assert filter_side(PHI, [Filter("suppkey", "=", 1)]) == "rhs"

    def test_lhs(self):
        assert filter_side(PHI, [Filter("orderkey", "between", 1, 5)]) == "lhs"

    def test_rhs_wins_mixed(self):
        fs = [Filter("orderkey", "=", 1), Filter("suppkey", "=", 2)]
        assert filter_side(PHI, fs) == "rhs"

    def test_unrelated(self):
        assert filter_side(PHI, [Filter("qty", "=", 1)]) is None


class TestRelevantRules:
    def test_overlap_selects(self):
        assert relevant_rules([PHI, PSI], {"orderkey"}) == [PHI]

    def test_shared_attr_selects_both(self):
        assert relevant_rules([PHI, PSI], {"suppkey"}) == [PHI, PSI]

    def test_dc_overlap(self):
        assert relevant_rules([DCR], {"extendedprice"}) == [DCR]

    def test_no_overlap(self):
        assert relevant_rules([PHI, DCR], {"qty"}) == []


class TestBuildPlan:
    RULES = {"lineorder": [PHI, DCR], "supplier": [PSI]}

    def test_sp_incremental_placement(self):
        q = Query("lineorder", [Filter("suppkey", "=", 3)])
        ops = [
            (o.op, o.placement) for o in build_plan(q, self.RULES)
        ]
        assert ops == [("scan", ""), ("filter", ""), ("clean_sigma", "after")]

    def test_full_clean_places_before_filter(self):
        q = Query("lineorder", [Filter("suppkey", "=", 3)])
        plan = build_plan(q, self.RULES, placement_by_table={"lineorder": "before"})
        kinds = [o.op for o in plan]
        assert kinds.index("clean_sigma") < kinds.index("filter")

    def test_dc_operator_kind(self):
        q = Query("lineorder", [Filter("extendedprice", "between", 1, 2)])
        plan = build_plan(q, self.RULES)
        assert any(o.op == "clean_dc" and o.rule == "dc" for o in plan)

    def test_irrelevant_rule_not_injected(self):
        q = Query("lineorder", [Filter("quantity", "=", 1)])
        plan = build_plan(q, self.RULES)
        assert all(o.op not in ("clean_sigma", "clean_dc") for o in plan)

    def test_join_key_rule_injects_clean_join(self):
        # Fig 3: a join over a potentially erroneous attribute gets clean_⋈
        q = Query("lineorder", [Filter("suppkey", "between", 1, 5)],
                  join=JoinSpec("supplier", "suppkey", "suppkey"))
        plan = build_plan(q, self.RULES)
        kinds = [o.op for o in plan]
        assert "clean_join" in kinds
        assert kinds.index("clean_join") > kinds.index("join")

    def test_join_without_ruled_key_skips_clean_join(self):
        rules = {"lineorder": [DCR], "supplier": []}
        q = Query("lineorder", join=JoinSpec("supplier", "custkey", "custkey"))
        plan = build_plan(q, rules)
        assert "clean_join" not in [o.op for o in plan]

    def test_groupby_last_cleaning_pushed_down(self):
        # §4: cleaning happens before the aggregation
        q = Query(
            "lineorder",
            [Filter("suppkey", "=", 1)],
            group_by=["orderkey"],
            aggs=[Aggregate("count", "*", "c")],
        )
        kinds = [o.op for o in build_plan(q, self.RULES)]
        assert kinds.index("clean_sigma") < kinds.index("groupby")
        assert kinds[-1] == "groupby"
