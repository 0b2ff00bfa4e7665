"""API-server substrate replacing django (paper §3.4, S6)."""
from repro.server.api import MiscelaApi, MineResponse  # noqa: F401
