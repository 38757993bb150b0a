"""Reproduction of "Toward Efficient Automated Feature Engineering"
(Wang, Wang, Xu — ICDE 2023). See DESIGN.md for the map."""
