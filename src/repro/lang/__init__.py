"""EQL language: AST (§2 definitions) and text parser."""
from .ast import BGP, CTP, Cond, CTPFilterSpec, EdgePattern, Pred, Query, const, typed, var  # noqa: F401
from .parser import ParseError, parse  # noqa: F401
