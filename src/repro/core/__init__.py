"""PolyFrame core: incremental query formation + language rewrite rules."""
from .aframe import PolyFrame, PolyFrameColumn, PolyFrameGroupBy
from .connector import DatasetNotRegistered, DBConnector
from .rewrite import (
    KNOWN_VARIABLES,
    MissingRewriteVariable,
    RewriteRules,
    UnknownRewriteRule,
    language_config_path,
    load_language,
    required_variables,
    substitute,
)

__all__ = [
    "PolyFrame",
    "PolyFrameColumn",
    "PolyFrameGroupBy",
    "DBConnector",
    "DatasetNotRegistered",
    "RewriteRules",
    "MissingRewriteVariable",
    "UnknownRewriteRule",
    "KNOWN_VARIABLES",
    "load_language",
    "language_config_path",
    "required_variables",
    "substitute",
]
