"""DIABLO core: loop-language AST, parser, restriction checker,
Figure-2 translation rules, comprehension normalizer/optimizer, and the
Spark DataFrame backend."""
