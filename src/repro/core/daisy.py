"""Daisy: the query-driven cleaning session (paper §6, Fig 4).

``DaisySession`` owns the (gradually cleaned) probabilistic tables, the
rules, the precomputed group statistics, the theta-join cleaners for general
DCs, and the §5.2.3 cost model.  ``execute`` runs one query of the §5
template: it builds the cleaning-aware logical plan, applies the cleaning
operators (:mod:`repro.core.operators`), updates the dataset in place, and
returns the cleaned (probabilistic) query result.

Strategy switching (Figs 7/12): with the cost model enabled, after each
query the session evaluates the incremental-vs-full inequality and, when it
flips, cleans the remaining dirty part of the table in one pass and stops
paying per-query cleaning cost.

``add_rules`` supports incremental rule arrival (Table 7): thanks to the
provenance base columns, adding a rule only runs the new rule's detection
and re-merges candidates of tuples dirty under both old and new rules —
no restart from scratch.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import detect, operators, repair, update
from repro.core.constraints import DC, FD, Rule, as_rules
from repro.core.cost import CostModel, QueryCost
from repro.core.planner import PlanOp, Query, build_plan, relevant_rules
from repro.core.prob import TID, checked_col, ensure_cands, ensure_checked
from repro.core.repair_dc import dc_fixes
from repro.core.thetajoin import ThetaJoinCleaner


@dataclass
class QueryRecord:
    """Per-query telemetry (drives EXPERIMENTS.md tables and tests)."""

    seconds: float
    answer: int
    extras: int
    repaired: int
    relax_iters: int = 0
    strategy: str = "incremental"
    dc_accuracy: float | None = None
    dc_mode: str | None = None


class DaisySession:
    """Query-driven incremental cleaning over Spark DataFrames."""

    def __init__(
        self,
        spark: SparkSession,
        tables: dict[str, DataFrame],
        rules: dict[str, list[Rule]],
        *,
        use_cost_model: bool = True,
        relax_mode: str = "lemma",
        dc_partitions: int = 64,
        accuracy_threshold: float = 0.5,
        cost_safety: float = 1.0,
    ):
        self.spark = spark
        self.relax_mode = relax_mode
        self.use_cost_model = use_cost_model
        self.accuracy_threshold = accuracy_threshold
        self.tables: dict[str, DataFrame] = {}
        self.fd_rules: dict[str, list[tuple[FD, int]]] = {}
        self.dc_rules: dict[str, list[DC]] = {}
        self.stats: dict[str, dict[str, DataFrame]] = {}
        self.theta: dict[tuple[str, str], ThetaJoinCleaner] = {}
        self.cost: dict[str, CostModel] = {}
        self.fully_cleaned: set[str] = set()
        self.dc_repairs: dict[str, DataFrame] = {}
        self.records: list[QueryRecord] = []
        self.switched_at: int | None = None
        self._dc_partitions = dc_partitions
        self._cost_safety = cost_safety
        for name, df in tables.items():
            if TID not in df.columns:
                raise ValueError(f"table {name} needs a {TID} column (prob.spark_with_tid)")
            self.tables[name] = df
            self.fd_rules[name] = []
            self.dc_rules[name] = []
            self.stats[name] = {}
            self.add_rules(name, rules.get(name, []))

    # ------------------------------------------------------------------ #
    def add_rules(self, table: str, new_rules: list[Rule]) -> None:
        """Register rules; precompute statistics (§6) and the cost model.

        Called again later, this is Table 7's incremental rule arrival:
        detection for the new rule runs over provenance values and merging
        with existing candidates happens lazily at repair time.
        """
        df = self.tables[table]
        for r in as_rules(new_rules):
            if isinstance(r, FD):
                world = repair.lhs_world(len(self.fd_rules[table]))
                self.fd_rules[table].append((r, world))
                df = ensure_cands(df, [a for a in r.attrs if len(r.lhs) == 1 or a == r.rhs])
                df = ensure_checked(df, [r.name])
                self.stats[table][r.name] = detect.group_stats(df, r).localCheckpoint(eager=True)
            else:
                self.dc_rules[table].append(r)
                self.theta[(table, r.name)] = ThetaJoinCleaner(
                    df, r, partitions=self._dc_partitions
                )
        self.tables[table] = df.localCheckpoint(eager=True)
        # cost model over the union of FD rules of this table: ε and p come
        # from the precomputed lhs and rhs group-bys (§5.2.3)
        n = self.tables[table].count()
        eps, groups, p = 0, 0, 0.0
        for fd, _w in self.fd_rules[table]:
            g, t, pp = detect.dirty_group_summary(self.stats[table][fd.name])
            eps += t
            groups += g
            p = max(p, pp, detect.rhs_domain_stat(self.tables[table], fd))
        avg_group = eps / groups if groups else 10.0
        self.cost[table] = CostModel(
            n=n,
            eps_total=eps,
            p=max(p, 1.0),
            avg_group_size=avg_group,
            safety=self._cost_safety,
        )
        self.fully_cleaned.discard(table)

    # ------------------------------------------------------------------ #
    def plan(self, q: Query) -> list[PlanOp]:
        """The cleaning-aware logical plan for ``q`` (Fig 3 / §5.1)."""
        placement = {
            t: ("before" if t in self.fully_cleaned else "after") for t in self.tables
        }
        rules_by_table = {
            t: [fd for fd, _ in self.fd_rules[t]] + self.dc_rules[t] for t in self.tables
        }
        return build_plan(q, rules_by_table, placement_by_table=placement)

    # ------------------------------------------------------------------ #
    def execute(self, q: Query) -> DataFrame:
        """Run one query: clean what it touches, return the cleaned result."""
        t0 = time.time()
        rec = QueryRecord(0.0, 0, 0, 0)
        if q.join is None:
            result = self._execute_sp(q, rec)
        else:
            result = self._execute_join(q, rec)
        rec.seconds = time.time() - t0
        self.records.append(rec)
        # cost-model strategy decision (Figs 7/12)
        table = q.table
        if (
            self.use_cost_model
            and table not in self.fully_cleaned
            and self.fd_rules[table]
        ):
            cm = self.cost[table]
            cm.record(QueryCost(q_i=rec.answer, e_i=rec.extras, eps_i=rec.repaired))
            if cm.should_switch():
                self.full_clean(table)
                self.switched_at = len(self.records)
        return result

    # ------------------------------------------------------------------ #
    def _effective_attrs(self, q: Query, table: str, side: str = "left") -> set[str]:
        """P ∪ W of §4.1; a query without a projection is SELECT * and
        therefore accesses every attribute of the table."""
        from repro.core.prob import base_attrs

        attrs = q.attrs(side)
        if side == "left" and q.project is None and not (q.group_by or q.aggs):
            attrs = attrs | set(base_attrs(self.tables[table]))
        return attrs

    def _execute_sp(self, q: Query, rec: QueryRecord) -> DataFrame:
        table = q.table
        df = self.tables[table]
        answer = operators.apply_filters(df, q.filters).localCheckpoint(eager=True)
        fds = relevant_rules(
            [r for r, _ in self.fd_rules[table]], self._effective_attrs(q, table)
        )
        if fds and table not in self.fully_cleaned:
            updated, st = operators.clean_sigma(
                df,
                answer,
                fds,
                self.fd_rules[table],
                self.stats[table],
                q.filters,
                relax_mode=self.relax_mode,
            )
            self.tables[table] = updated
            rec.answer, rec.extras = st.answer, st.extras
            rec.repaired, rec.relax_iters = st.repaired, st.relax_iters
        else:
            rec.answer = answer.count()
            rec.strategy = "clean" if table in self.fully_cleaned else "no-rule"
        dcs = relevant_rules(self.dc_rules[table], self._effective_attrs(q, table))
        for dc in dcs:
            self._clean_dc(table, dc, q, rec)
        final = operators.apply_filters(self.tables[table], q.filters)
        if q.group_by or q.aggs:
            return operators.aggregate(final, q)
        if q.project:
            cols = []
            for c in q.project:
                cols.append(c)
                from repro.core.prob import cands_col

                if cands_col(c) in final.columns:
                    cols.append(cands_col(c))
            return final.select(TID, *cols)
        return final

    # ------------------------------------------------------------------ #
    def _execute_join(self, q: Query, rec: QueryRecord) -> DataFrame:
        lt, rt = q.table, q.join.right_table
        lrules = relevant_rules(
            [r for r, _ in self.fd_rules[lt]], self._effective_attrs(q, lt)
        )
        rrules = relevant_rules([r for r, _ in self.fd_rules[rt]], q.attrs("right"))
        if lt in self.fully_cleaned:
            lrules = []
        if rt in self.fully_cleaned:
            rrules = []
        lupd, rupd, joined, lst, rst = operators.clean_join(
            self.tables[lt],
            self.tables[rt],
            q,
            lrules,
            rrules,
            self.fd_rules[lt],
            self.fd_rules[rt],
            self.stats[lt],
            self.stats[rt],
            relax_mode=self.relax_mode,
        )
        self.tables[lt] = lupd
        self.tables[rt] = rupd
        rec.answer = lst.answer + rst.answer
        rec.extras = lst.extras + rst.extras
        rec.repaired = lst.repaired + rst.repaired
        rec.relax_iters = max(lst.relax_iters, rst.relax_iters)
        if q.group_by or q.aggs:
            return operators.aggregate(joined, q, prefix="l_")
        return joined

    # ------------------------------------------------------------------ #
    def _clean_dc(self, table: str, dc: DC, q: Query, rec: QueryRecord) -> None:
        """Incremental theta-join cleaning with the Alg. 2 accuracy gate."""
        theta = self.theta[(table, dc.name)]
        xattr = theta.x
        buckets: set[int] = set()
        for f in q.filters:
            if f.attr != xattr:
                continue
            if f.op == "between":
                lo, hi = theta.bucket_of(float(f.value)), theta.bucket_of(float(f.value2))
                buckets |= set(range(lo, hi + 1))
            elif f.op == "=":
                buckets.add(theta.bucket_of(float(f.value)))
        if not buckets:
            buckets = set(range(theta.nb))
        answer_size = max(1, rec.answer)
        acc, support = theta.accuracy(buckets, answer_size)
        rec.dc_accuracy = acc
        if acc < self.accuracy_threshold:
            viol = theta.detect(None)  # full cleaning (Fig 10's 20% case)
            rec.dc_mode = "full"
        else:
            viol = theta.detect(buckets)
            rec.dc_mode = "partial"
        fixes = dc_fixes(viol, dc).localCheckpoint(eager=True)
        prev = self.dc_repairs.get(table)
        self.dc_repairs[table] = (
            fixes if prev is None else prev.unionByName(fixes).localCheckpoint(eager=True)
        )
        rec.repaired += fixes.select("tid").distinct().count()

    # ------------------------------------------------------------------ #
    def full_clean(self, table: str) -> None:
        """Clean the remaining dirty part of ``table`` in one pass (§5.2.3).

        Only unchecked violating groups are repaired — the part already
        cleaned incrementally is not re-done (Fig 7: "cleaning is applied
        over the remaining dirty part of the dataset").
        """
        df = self.tables[table]
        rules = self.fd_rules[table]
        if rules:
            dm = None
            checked: dict[str, DataFrame] = {}
            for fd, _w in rules:
                stats = self.stats[table][fd.name]
                dirty = stats.where(F.col("n_rhs") > 1).select(*fd.lhs)
                members = (
                    df.where(~F.col(checked_col(fd.name)))
                    .join(dirty, list(fd.lhs), "leftsemi")
                    .select(TID)
                    .withColumn("rule_name", F.lit(fd.name))
                )
                dm = members if dm is None else dm.unionByName(members)
                checked[fd.name] = df.select(TID)
            # re-merge with already-repaired rules: every dirty tuple is
            # listed under every rule whose dirty groups contain it
            aug = [dm]
            dirty_tids = dm.select(TID).distinct()
            for fd, _w in rules:
                stats = self.stats[table][fd.name]
                dirty = stats.where(F.col("n_rhs") > 1).select(*fd.lhs)
                aug.append(
                    df.join(dirty_tids, TID, "leftsemi")
                    .join(dirty, list(fd.lhs), "leftsemi")
                    .select(TID)
                    .withColumn("rule_name", F.lit(fd.name))
                )
            full_map = aug[0]
            for a in aug[1:]:
                full_map = full_map.unionByName(a)
            fixes = repair.compute_repairs(df, rules, full_map.distinct())
            df = update.apply_repairs(df, fixes, checked)
            self.tables[table] = df
        self.fully_cleaned.add(table)

    # ------------------------------------------------------------------ #
    def table(self, name: str) -> DataFrame:
        """The current (gradually cleaned) probabilistic table."""
        return self.tables[name]

    def total_seconds(self) -> float:
        return sum(r.seconds for r in self.records)
