"""The temporal-probabilistic data model: schema conventions, validation, and per-time-point snapshot semantics."""
