"""Recursive-descent parser for the openCypher fragment.

Grammar (terminals in caps; ``[x]`` optional, ``{x}`` repeated)::

    query     := MATCH part {',' part} [WHERE conj] [UNWIND unwind] return
    part      := [IDENT '='] node {rel node}
    node      := '(' [IDENT] [':' IDENT] ')'
    rel       := '-' '[' relbody ']' '->'   |  '<-' '[' relbody ']' '-'
    relbody   := [IDENT] [':' IDENT] ['*' [INT] ['..' [INT]]]
    conj      := term {AND term}            -- OR only *inside* a term
    term      := NOT EXISTS '{' part {',' part} '}'  |  orexpr
    orexpr    := andexpr {OR andexpr}
    andexpr   := notexpr {AND notexpr}      -- (inside parentheses)
    notexpr   := NOT notexpr | '(' orexpr ')' | cmp
    cmp       := value op value             -- op ∈ {=, <>, <, <=, >, >=}
    value     := IDENT '.' IDENT | literal
    unwind    := NODES '(' IDENT ')' AS IDENT
    return    := RETURN [DISTINCT] item {',' item}
    item      := (IDENT | IDENT '.' IDENT) [AS IDENT]

Out-of-fragment constructs (ORDER BY, SKIP, LIMIT, OPTIONAL MATCH, WITH,
aggregation calls, list literals) raise
:class:`~repro.cypher.ast.UnsupportedCypherError` with the paper's reason.
"""
from __future__ import annotations

import math
from typing import List, Optional, Tuple

from repro.algebra import expr as ex
from repro.cypher import ast
from repro.cypher.lexer import CypherSyntaxError, Token, tokenize

_AGGREGATES = {"count", "collect", "sum", "avg", "min", "max"}

_REJECT_REASON = {
    "ORDER": "ORDER BY requires ordered results; the fragment only retains "
    "order for atomic paths (paper §4: no top-k queries)",
    "SKIP": "SKIP is excluded from the fragment (paper §4 'Limitations')",
    "LIMIT": "LIMIT/top-k is excluded: ordering is only kept for atomic paths (paper §4)",
    "OPTIONAL": "OPTIONAL MATCH is left for future work (paper §4 'Limitations')",
    "WITH": "WITH is left for future work (paper §4 'Limitations')",
    "CREATE": "updates go through the transaction API, not the query language",
    "DELETE": "updates go through the transaction API, not the query language",
    "SET": "updates go through the transaction API, not the query language",
    "MERGE": "updates go through the transaction API, not the query language",
}


class _Parser:
    def __init__(self, tokens: List[Token]):
        self.toks = tokens
        self.i = 0

    # ------------------------------------------------------------- helpers
    def peek(self) -> Token:
        return self.toks[self.i]

    def next(self) -> Token:
        t = self.toks[self.i]
        self.i += 1
        return t

    def at_punct(self, v: str) -> bool:
        t = self.peek()
        return t.kind == "PUNCT" and t.value == v

    def at_kw(self, v: str) -> bool:
        t = self.peek()
        return t.kind == "KW" and t.value == v

    def expect_punct(self, v: str) -> Token:
        t = self.next()
        if t.kind != "PUNCT" or t.value != v:
            raise CypherSyntaxError(f"expected {v!r} at {t.pos}, got {t.value!r}")
        return t

    def expect_kw(self, v: str) -> Token:
        t = self.next()
        if t.kind != "KW" or t.value != v:
            raise CypherSyntaxError(f"expected {v} at {t.pos}, got {t.value!r}")
        return t

    def expect_ident(self) -> str:
        t = self.next()
        if t.kind != "IDENT":
            raise CypherSyntaxError(f"expected identifier at {t.pos}, got {t.value!r}")
        return t.value

    def reject_if_unsupported(self) -> None:
        t = self.peek()
        if t.kind == "KW" and t.value in _REJECT_REASON:
            raise ast.UnsupportedCypherError(
                f"{t.value} is outside the maintainable fragment: {_REJECT_REASON[t.value]}"
            )

    # --------------------------------------------------------------- query
    def query(self) -> ast.Query:
        self.reject_if_unsupported()
        self.expect_kw("MATCH")
        patterns = [self.part()]
        while self.at_punct(","):
            self.next()
            patterns.append(self.part())
        where = None
        if self.at_kw("WHERE"):
            self.next()
            where = self.where_conj()
        unwind = None
        if self.at_kw("UNWIND"):
            self.next()
            unwind = self.unwind()
        self.reject_if_unsupported()
        self.expect_kw("RETURN")
        distinct = False
        if self.at_kw("DISTINCT"):
            self.next()
            distinct = True
        items = [self.return_item()]
        while self.at_punct(","):
            self.next()
            items.append(self.return_item())
        self.reject_if_unsupported()
        t = self.peek()
        if t.kind != "EOF":
            raise CypherSyntaxError(f"trailing input at {t.pos}: {t.value!r}")
        return ast.Query(
            patterns=tuple(patterns),
            where=where,
            unwind=unwind,
            distinct=distinct,
            items=tuple(items),
        )

    # ------------------------------------------------------------ patterns
    def part(self) -> ast.PathPattern:
        path_var = None
        if self.peek().kind == "IDENT" and self.toks[self.i + 1].kind == "PUNCT" and self.toks[self.i + 1].value == "=":
            path_var = self.next().value
            self.next()  # '='
        nodes = [self.node()]
        rels: List[ast.RelPattern] = []
        while self.at_punct("-") or self.at_punct("<-"):
            rels.append(self.rel())
            nodes.append(self.node())
        return ast.PathPattern(path_var=path_var, nodes=tuple(nodes), rels=tuple(rels))

    def node(self) -> ast.NodePattern:
        self.expect_punct("(")
        var = None
        label = None
        if self.peek().kind == "IDENT":
            var = self.next().value
        if self.at_punct(":"):
            self.next()
            label = self.expect_ident()
        self.expect_punct(")")
        return ast.NodePattern(var=var, label=label)

    def rel(self) -> ast.RelPattern:
        if self.at_punct("<-"):
            self.next()
            direction = "in"
        else:
            self.expect_punct("-")
            direction = "out"
        self.expect_punct("[")
        var = None
        etype = None
        min_hops, max_hops = 1, 1.0
        if self.peek().kind == "IDENT":
            var = self.next().value
        if self.at_punct(":"):
            self.next()
            etype = self.expect_ident()
        if self.at_punct("*"):
            self.next()
            min_hops, max_hops = 1, math.inf
            if self.peek().kind == "INT":
                min_hops = int(self.next().value)
                max_hops = float(min_hops)
                if self.at_punct(".."):
                    self.next()
                    max_hops = math.inf
                    if self.peek().kind == "INT":
                        max_hops = float(int(self.next().value))
            elif self.at_punct(".."):
                self.next()
                if self.peek().kind == "INT":
                    max_hops = float(int(self.next().value))
            if var is not None:
                raise ast.UnsupportedCypherError(
                    "binding a variable-length relationship to a list variable "
                    "is outside the fragment (lists are not supported; name the "
                    "path instead: 'p = (…)-[:T*]->(…)')"
                )
        self.expect_punct("]")
        if direction == "in":
            self.expect_punct("-")
        else:
            if self.at_punct("->"):
                self.next()
            else:
                raise ast.UnsupportedCypherError(
                    "undirected relationships are outside the fragment "
                    "(get-edges ⇑ is directional); write -[..]-> or <-[..]-"
                )
        if min_hops < 0 or (max_hops != math.inf and max_hops < min_hops):
            raise CypherSyntaxError(f"bad hop range *{min_hops}..{max_hops}")
        return ast.RelPattern(
            var=var, edge_type=etype, direction=direction, min_hops=min_hops, max_hops=max_hops
        )

    # --------------------------------------------------------------- where
    def where_conj(self) -> ast.Where:
        predicates: List[ex.Expr] = []
        not_exists: List[ast.NotExists] = []
        while True:
            if self.at_kw("NOT") and self.toks[self.i + 1].kind == "KW" and self.toks[self.i + 1].value == "EXISTS":
                self.next()
                self.next()
                self.expect_punct("{")
                pats = [self.part()]
                while self.at_punct(","):
                    self.next()
                    pats.append(self.part())
                self.expect_punct("}")
                not_exists.append(ast.NotExists(patterns=tuple(pats)))
            elif self.at_kw("EXISTS"):
                raise ast.UnsupportedCypherError(
                    "bare EXISTS (semijoin) is not implemented; only NOT EXISTS"
                )
            else:
                predicates.append(self.or_expr())
            if self.at_kw("AND"):
                self.next()
                continue
            break
        return ast.Where(predicates=tuple(predicates), not_exists=tuple(not_exists))

    def or_expr(self) -> ex.Expr:
        e = self.and_expr()
        while self.at_kw("OR"):
            self.next()
            e = ex.Or(e, self.and_expr())
        return e

    def _not_exists_ahead(self, offset: int) -> bool:
        a, b = self.toks[self.i + offset], self.toks[self.i + offset + 1]
        return a.kind == "KW" and a.value == "NOT" and b.kind == "KW" and b.value == "EXISTS"

    def and_expr(self) -> ex.Expr:
        e = self.not_expr()
        # Stop before `AND NOT EXISTS {…}` so where_conj can parse the
        # pattern-negation term; scalar ANDs are consumed greedily (AND is
        # associative, so conjunct splitting is semantics-preserving).
        while self.at_kw("AND") and not self._not_exists_ahead(1):
            self.next()
            e = ex.And(e, self.not_expr())
        return e

    def not_expr(self) -> ex.Expr:
        if self._not_exists_ahead(0):
            raise ast.UnsupportedCypherError(
                "NOT EXISTS must be a top-level WHERE conjunct (it compiles "
                "to an anti-join, not a scalar predicate)"
            )
        if self.at_kw("NOT"):
            self.next()
            return ex.Not(self.not_expr())
        if self.at_punct("("):
            self.next()
            e = self.or_expr()
            self.expect_punct(")")
            return e
        return self.comparison()

    def comparison(self) -> ex.Expr:
        left = self.value()
        t = self.next()
        if t.kind != "PUNCT" or t.value not in {"=", "<>", "<", "<=", ">", ">="}:
            raise CypherSyntaxError(f"expected comparison operator at {t.pos}, got {t.value!r}")
        right = self.value()
        return ex.Cmp(t.value, left, right)

    def value(self) -> ex.Expr:
        t = self.peek()
        if t.kind == "IDENT":
            name = self.next().value
            if name in _AGGREGATES and self.at_punct("("):
                raise ast.UnsupportedCypherError(
                    f"aggregation {name}() is outside the fragment (paper §4 'Limitations')"
                )
            if self.at_punct("."):
                self.next()
                key = self.expect_ident()
                return ex.PropAccess(name, key)
            return ex.Attr(name)
        if t.kind == "INT":
            self.next()
            return ex.Lit(int(t.value))
        if t.kind == "FLOAT":
            self.next()
            return ex.Lit(float(t.value))
        if t.kind == "STRING":
            self.next()
            return ex.Lit(t.value)
        if t.kind == "PUNCT" and t.value == "-":
            self.next()
            t2 = self.next()
            if t2.kind == "INT":
                return ex.Lit(-int(t2.value))
            if t2.kind == "FLOAT":
                return ex.Lit(-float(t2.value))
            raise CypherSyntaxError(f"expected number after '-' at {t.pos}")
        if t.kind == "PUNCT" and t.value == "[":
            raise ast.UnsupportedCypherError(
                "list literals are outside the fragment: the data model only "
                "allows bags, and ordered lists only as atomic paths (paper §4)"
            )
        raise CypherSyntaxError(f"expected value at {t.pos}, got {t.value!r}")

    # ------------------------------------------------------------- tail
    def unwind(self) -> ast.Unwind:
        self.expect_kw("NODES")
        self.expect_punct("(")
        path_var = self.expect_ident()
        self.expect_punct(")")
        self.expect_kw("AS")
        out_var = self.expect_ident()
        return ast.Unwind(path_var=path_var, out_var=out_var)

    def return_item(self) -> ast.ReturnItem:
        t = self.peek()
        if t.kind != "IDENT":
            if t.kind == "KW" and t.value in _REJECT_REASON:
                self.reject_if_unsupported()
            raise CypherSyntaxError(f"expected return item at {t.pos}, got {t.value!r}")
        name = self.next().value
        if name in _AGGREGATES and self.at_punct("("):
            raise ast.UnsupportedCypherError(
                f"aggregation {name}() is outside the fragment (paper §4 'Limitations')"
            )
        expr: ex.Expr
        default_alias = name
        if self.at_punct("."):
            self.next()
            key = self.expect_ident()
            expr = ex.PropAccess(name, key)
            default_alias = f"{name}_{key}"
        else:
            expr = ex.Attr(name)
        alias = default_alias
        if self.at_kw("AS"):
            self.next()
            alias = self.expect_ident()
        return ast.ReturnItem(expr=expr, alias=alias)


def parse(text: str) -> ast.Query:
    """Parse a query in the openCypher fragment; raise on syntax errors or
    constructs outside the fragment."""
    return _Parser(tokenize(text)).query()
