"""Relational AST -> DBSP circuits (Table 1) and Algorithm 4.8."""
