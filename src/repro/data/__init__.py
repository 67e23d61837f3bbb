"""Synthetic stand-ins for the paper's evaluation datasets (see DESIGN.md)."""
from .airbnb import airbnb, AIRBNB_DIMS, airbnb_dims  # noqa: F401
from .store_sales import store_sales, STORE_SALES_DIMS, store_sales_dims  # noqa: F401
from .musicbrainz import musicbrainz_tables, MUSICBRAINZ_DIMS  # noqa: F401
