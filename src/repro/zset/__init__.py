"""Z-sets: the abelian group underlying DBSP's relational model (§4)."""
from .frame import W, ZSet  # noqa: F401
